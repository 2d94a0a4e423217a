"""Pluggable-module registries (paper Goal 3: extensibility).

Models, triggering policies, presampling strategies, downsamplers, and
metrics register themselves by name; pipeline YAML/dict configs refer to
those names, so users add policies as plain Python modules without
touching platform code — the paper's "pluggable Python modules".
"""
from __future__ import annotations

from typing import Callable, Generic, Iterator, TypeVar

T = TypeVar("T")


class Registry(Generic[T]):
    """A named collection of pluggable implementations."""

    def __init__(self, kind: str) -> None:
        self.kind = kind
        self._items: dict[str, T] = {}

    def register(self, name: str) -> Callable[[T], T]:
        """Class decorator: ``@REGISTRY.register("Name")``."""

        def deco(cls: T) -> T:
            if name in self._items:
                raise ValueError(f"{self.kind} {name!r} already registered")
            self._items[name] = cls
            return cls

        return deco

    def get(self, name: str) -> T:
        try:
            return self._items[name]
        except KeyError:
            raise KeyError(
                f"unknown {self.kind} {name!r}; available: {sorted(self._items)}"
            ) from None

    def __contains__(self, name: str) -> bool:
        return name in self._items

    def __iter__(self) -> Iterator[str]:
        return iter(sorted(self._items))


MODELS: Registry = Registry("model")
TRIGGERS: Registry = Registry("trigger policy")
PRESAMPLING_STRATEGIES: Registry = Registry("presampling strategy")
DOWNSAMPLERS: Registry = Registry("downsampler")
METRICS: Registry = Registry("metric")

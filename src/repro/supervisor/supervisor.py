"""Supervisor orchestration loop (paper §3.4 data flow, steps 1-3).

The storage announces new samples by key; the supervisor runs the
triggering policy over the announcement stream, forwards samples to the
selector, and fires the training callback on each trigger — slicing each
batch exactly at the trigger indices so a trigger's training set contains
precisely the samples up to the triggering one (§3.1).
"""
from __future__ import annotations

from typing import Callable

import numpy as np

from repro.selector.selector import Selector, TriggerSetInfo
from repro.supervisor.triggers import Trigger


class Supervisor:
    """Per-pipeline orchestrator: trigger policy + selector + train hook."""

    def __init__(
        self,
        trigger: Trigger,
        selector: Selector,
        on_trigger: Callable[[TriggerSetInfo], None],
        *,
        on_inform: Callable[[int, np.ndarray, np.ndarray, np.ndarray], None]
        | None = None,
    ) -> None:
        self.trigger = trigger
        self.selector = selector
        self.on_trigger = on_trigger
        self.on_inform = on_inform
        self._pending_since_trigger = 0
        self.triggers_fired: list[TriggerSetInfo] = []

    def _inform(
        self, keys: np.ndarray, timestamps: np.ndarray, labels: np.ndarray
    ) -> None:
        self.selector.inform_data(keys, timestamps, labels)
        if self.on_inform is not None:
            self.on_inform(self.selector.current_trigger, keys, timestamps, labels)

    def _fire(self) -> None:
        info = self.selector.trigger()
        self._pending_since_trigger = 0
        self.triggers_fired.append(info)
        self.on_trigger(info)

    def process_batch(
        self, keys: np.ndarray, timestamps: np.ndarray, labels: np.ndarray
    ) -> int:
        """Handle one announcement batch; returns #triggers fired."""
        keys = np.asarray(keys, np.int64)
        timestamps = np.asarray(timestamps, np.int64)
        labels = np.asarray(labels, np.int64)
        fired = 0
        cut = 0  # first index not yet informed to the selector
        for idx in self.trigger.inform(keys, timestamps):
            if idx >= cut:
                self._inform(
                    keys[cut : idx + 1],
                    timestamps[cut : idx + 1],
                    labels[cut : idx + 1],
                )
                self._pending_since_trigger += idx + 1 - cut
                cut = idx + 1
            if self._pending_since_trigger > 0:  # never train on nothing
                self._fire()
                fired += 1
        if cut < len(keys):
            self._inform(keys[cut:], timestamps[cut:], labels[cut:])
            self._pending_since_trigger += len(keys) - cut
        return fired

    def flush(self) -> int:
        """End of stream (experiment mode): fire a final trigger for any
        samples announced after the last boundary."""
        if self._pending_since_trigger > 0:
            self._fire()
            return 1
        return 0

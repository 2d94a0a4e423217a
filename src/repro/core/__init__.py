"""Core orchestration: pipeline configs, pluggable registries, and the
end-to-end pipeline executor (paper §3.4/§3.5).

``Pipeline`` is exported lazily: submodules across the codebase import
``repro.core.registry`` at import time, and an eager re-export of
``repro.core.pipeline`` here would close an import cycle back through
the selector/trainer packages.
"""
from repro.core.registry import Registry

__all__ = ["PipelineConfig", "Pipeline", "PipelineResult", "Registry"]


def __getattr__(name: str):
    if name == "PipelineConfig":
        from repro.core.config import PipelineConfig

        return PipelineConfig
    if name in ("Pipeline", "PipelineResult"):
        from repro.core import pipeline

        return getattr(pipeline, name)
    raise AttributeError(f"module {__name__!r} has no attribute {name!r}")

"""Model storage component (paper §4.3): compressed full + delta models."""
from repro.model_storage.model_storage import ModelStorage, StoredModelInfo
from repro.model_storage.policies import (
    FullModelStrategy,
    WeightsDifferenceStrategy,
)

__all__ = [
    "ModelStorage",
    "StoredModelInfo",
    "FullModelStrategy",
    "WeightsDifferenceStrategy",
]

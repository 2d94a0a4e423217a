"""Trainer server (paper §4.1.3): OnlineDataset data path + training loop."""
from repro.trainer.online_dataset import Batch, InMemoryDataset, OnlineDataset, OnlineDatasetConfig
from repro.trainer.trainer import Trainer, TrainResult

__all__ = [
    "Batch",
    "OnlineDataset",
    "OnlineDatasetConfig",
    "InMemoryDataset",
    "Trainer",
    "TrainResult",
]

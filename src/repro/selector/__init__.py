"""Selector service (paper §4.1.2 + §4.2.2).

Implements data-selection policies over per-pipeline sample metadata.
Presampling strategies run against a *metadata backend* — either the
Spark-SQL backend (Parquet partitioned by trigger, the paper's Postgres
analog) or the fast local binary backend — and persist each trigger
training set to the ``TriggerSampleStorage`` as fixed-size partitions.
Downsampling policies run inside the trainer (sample-then-batch or
batch-then-sample) and are defined in ``downsampling``.
"""
from repro.selector.metadata_backend import (
    LocalMetadataBackend,
    MetadataBackend,
    SparkMetadataBackend,
)
from repro.selector.selector import Selector
from repro.selector.trigger_sample_storage import TriggerSampleStorage

__all__ = [
    "MetadataBackend",
    "SparkMetadataBackend",
    "LocalMetadataBackend",
    "Selector",
    "TriggerSampleStorage",
]

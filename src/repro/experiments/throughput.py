"""Training-throughput experiments (paper §5.1, Figures 7 & 8; T1-T3).

Measures end-to-end training throughput of the Modyn data path
(selector -> TriggerSampleStorage -> storage -> OnlineDataset -> trainer)
while sweeping the five §5.1 knobs, and compares against the local
sequential-read baseline that has no sample-level selection.

The "GPU" is simulated by a fixed per-batch device time
(``gpu_step_seconds``) on top of the real numpy model update; the paper
does not synchronize CUDA, so device time overlaps data fetching there —
here the sleep provides the same overlap target for the prefetchers.
Criteo-lite uses a small device time (memory-bound workload); cloc-lite
a large one (compute-bound), which is what makes its throughput saturate
with ≥4 workers as in Figure 8b.
"""
from __future__ import annotations

import os
import sys
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.models import DlrmLite, SoftmaxRegression
from repro.selector.metadata_backend import LocalMetadataBackend
from repro.selector.presampling import NewDataStrategy
from repro.selector.selector import Selector
from repro.selector.trigger_sample_storage import TriggerSampleStorage
from repro.storage.file_wrappers import BinaryFileWrapper, SingleSampleFileWrapper
from repro.storage.local_dataset import LocalDataset
from repro.storage.storage import Storage
from repro.synth_data import (
    CRITEO_DTYPE,
    cloc_batch_parser,
    criteo_batch_parser,
    generate_cloc_files,
    generate_criteo_files,
)
from repro.trainer.online_dataset import OnlineDataset, OnlineDatasetConfig
from repro.trainer.trainer import Trainer

# The throughput experiments run ~40 threads (workers, prefetchers,
# storage pool, consumer); CPython's default 5 ms GIL switch interval
# makes every thread wake-up pay up to 5 ms of convoy latency, which
# would swamp the millisecond-scale effects being measured. 0.5 ms keeps
# handoffs cheap without measurable single-thread cost.
sys.setswitchinterval(0.0005)

# Device-time defaults, calibrated so criteo-lite is memory-bound (fetch
# is the bottleneck) and cloc-lite is compute-bound (the device is).
CRITEO_BATCH = 4096
CRITEO_GPU_SECONDS = 0.020
CLOC_BATCH = 256
CLOC_GPU_SECONDS = 0.12
#: simulated per-sample decode+augmentation CPU cost for cloc-lite; the
#: paper's CLOC workers JPEG-decode and augment each image (~ms each),
#: which is why its throughput rises until ~4 workers then stagnates.
CLOC_DECODE_BYTES_PER_SAMPLE = 1_800_000

# Hash a 1 MB chunk repeatedly: long enough that each call releases the
# GIL for ~1 ms (few handoffs), small enough to stay cache-friendly —
# measured to scale ~9x across 16 threads on this box.
_DECODE_CHUNK = b"\xa5" * 1_048_576


def make_decode_transform(bytes_per_sample: int):
    """A batch transform burning real, GIL-releasing CPU per sample.

    ``hashlib.sha256`` releases the GIL for large buffers, so this cost
    parallelizes across dataloader workers exactly like the paper's
    image decode + augmentations do across DataLoader processes.
    """
    import hashlib

    repeats = max(1, round(bytes_per_sample / len(_DECODE_CHUNK)))

    def transform(arr: np.ndarray) -> np.ndarray:
        for _ in range(len(arr) * repeats):
            hashlib.sha256(_DECODE_CHUNK).digest()
        return arr

    return transform


@dataclass
class WorkloadSetup:
    """One ingested workload with a single materialized trigger set."""

    name: str
    storage: Storage
    selector: Selector
    trigger_id: int
    files: list[str]  # payload files, for the local baseline
    n_samples: int
    batch_parser: object  # vectorized buffer-level parser (hot path)
    batch_size: int
    gpu_step_seconds: float
    transform: object = None  # per-batch worker-side transform (decode sim)

    def make_model(self):
        if self.name.startswith("criteo"):
            return DlrmLite(seed=0)
        return SoftmaxRegression(dim=16, n_classes=32, seed=0)


def _materialize_trigger(
    spark: SparkSession,
    root: str,
    storage: Storage,
    keys: np.ndarray,
    *,
    partition_size: int,
    tag: str,
) -> Selector:
    backend = LocalMetadataBackend(os.path.join(root, f"meta_{tag}"))
    strategy = NewDataStrategy(
        backend, reset_after_trigger=False, partition_size=partition_size
    )
    selector = Selector(
        f"bench_{tag}", strategy, TriggerSampleStorage(os.path.join(root, f"tss_{tag}"))
    )
    selector.inform_data(keys, np.zeros(len(keys)), np.zeros(len(keys)))
    selector.trigger()
    return selector


def build_criteo_setup(
    spark: SparkSession,
    root: str,
    *,
    n_samples: int = 120_000,
    samples_per_file: int = 20_000,
    partition_size: int = 10_000,
    batch_size: int = CRITEO_BATCH,
    gpu_step_seconds: float = CRITEO_GPU_SECONDS,
) -> WorkloadSetup:
    """Generate+ingest criteo-lite and materialize one trigger set.

    ``root`` must be a fresh directory; several partition sizes share the
    one ingested dataset via ``add_trigger_set``.
    """
    wrapper = BinaryFileWrapper(CRITEO_DTYPE)
    storage = Storage(spark, os.path.join(root, "storage"), wrapper)
    paths, days = generate_criteo_files(
        os.path.join(root, "data"),
        n_samples=n_samples,
        samples_per_file=samples_per_file,
    )
    storage.ingest_files(paths, timestamps=days)
    keys = np.arange(n_samples)
    selector = _materialize_trigger(
        spark, root, storage, keys, partition_size=partition_size,
        tag=f"p{partition_size}",
    )
    return WorkloadSetup(
        "criteo_lite",
        storage,
        selector,
        0,
        paths,
        n_samples,
        criteo_batch_parser,
        batch_size,
        gpu_step_seconds,
    )


def add_trigger_set(
    spark: SparkSession, root: str, setup: WorkloadSetup, *, partition_size: int
) -> WorkloadSetup:
    """A second trigger set over the same storage at another partition size."""
    keys = np.arange(setup.n_samples)
    selector = _materialize_trigger(
        spark, root, setup.storage, keys, partition_size=partition_size,
        tag=f"p{partition_size}",
    )
    return WorkloadSetup(
        setup.name,
        setup.storage,
        selector,
        0,
        setup.files,
        setup.n_samples,
        setup.batch_parser,
        setup.batch_size,
        setup.gpu_step_seconds,
        setup.transform,
    )


def build_cloc_setup(
    spark: SparkSession,
    root: str,
    *,
    n_samples: int = 12_000,
    partition_size: int = 1500,
    batch_size: int = CLOC_BATCH,
    gpu_step_seconds: float = CLOC_GPU_SECONDS,
) -> WorkloadSetup:
    """cloc-lite: one sample per file (+ label sidecar), one trigger."""
    paths, years = generate_cloc_files(
        os.path.join(root, "data"),
        per_year=n_samples,
        years=(2004,),
        n_classes=32,
        dim=16,
    )
    storage = Storage(
        spark, os.path.join(root, "storage"), SingleSampleFileWrapper()
    )
    storage.ingest_files(paths, timestamps=years)
    selector = _materialize_trigger(
        spark, root, storage, np.arange(n_samples),
        partition_size=partition_size, tag="cloc",
    )
    return WorkloadSetup(
        "cloc_lite",
        storage,
        selector,
        0,
        paths,
        n_samples,
        cloc_batch_parser,
        batch_size,
        gpu_step_seconds,
        make_decode_transform(CLOC_DECODE_BYTES_PER_SAMPLE),
    )


# ------------------------------------------------------------ measurements
def measure_modyn(
    setup: WorkloadSetup,
    *,
    workers: int,
    prefetched_partitions: int,
    parallel_prefetch: int,
    storage_threads: int,
) -> float:
    """End-to-end Modyn training throughput (samples/s) for one config."""
    dataset = OnlineDataset(
        setup.storage,
        setup.selector,
        setup.trigger_id,
        OnlineDatasetConfig(
            batch_size=setup.batch_size,
            num_workers=workers,
            prefetched_partitions=prefetched_partitions,
            parallel_prefetch_requests=parallel_prefetch,
            storage_threads=storage_threads,
        ),
        batch_bytes_parser=setup.batch_parser,
        transform=setup.transform,
    )
    trainer = Trainer(
        setup.make_model(), lr=0.05, epochs=1,
        gpu_step_seconds=setup.gpu_step_seconds,
    )
    result = trainer.train(dataset)
    assert result.num_samples == setup.n_samples
    return result.throughput


def measure_local(setup: WorkloadSetup, *, workers: int) -> float:
    """Baseline throughput: sequential whole-file reads, no selection."""
    wrapper = setup.storage.file_wrapper

    class _Adapter:
        """LocalDataset -> trainer Batch adapter (same training loop)."""

        def batches(self):
            from repro.trainer.online_dataset import Batch

            inner = LocalDataset(
                setup.files,
                wrapper,
                batch_size=setup.batch_size,
                num_workers=workers,
                batch_bytes_parser=setup.batch_parser,
                transform=setup.transform,
            )
            for payloads, labels in inner.batches():
                n = len(labels)
                yield Batch(payloads, labels, np.ones(n), np.arange(n))

    trainer = Trainer(
        setup.make_model(), lr=0.05, epochs=1,
        gpu_step_seconds=setup.gpu_step_seconds,
    )
    result = trainer.train(_Adapter())
    assert result.num_samples == setup.n_samples
    return result.throughput


# -------------------------------------------------------------- the tables
#: (prefetched partitions, parallel prefetch requests) columns of Fig. 7;
#: (0, -) is "no prefetching".
PREFETCH_CONFIGS = [(0, 1), (1, 1), (2, 1), (6, 1), (6, 2)]


def criteo_grid(
    spark: SparkSession,
    root: str,
    *,
    n_samples: int = 120_000,
    partition_sizes: tuple[int, int] = (6_000, 30_000),
    workers: tuple[int, ...] = (1, 4, 8, 16),
    storage_threads: tuple[int, ...] = (1, 2, 8),
    prefetch_configs=None,
) -> pd.DataFrame:
    """T1 (Fig. 7): the full Criteo throughput sweep as a tidy table."""
    prefetch_configs = prefetch_configs or PREFETCH_CONFIGS
    base = build_criteo_setup(
        spark, root, n_samples=n_samples, partition_size=partition_sizes[0]
    )
    setups = {partition_sizes[0]: base}
    for ps in partition_sizes[1:]:
        setups[ps] = add_trigger_set(spark, root, base, partition_size=ps)
    rows = []
    for ps, setup in setups.items():
        for st in storage_threads:
            for w in workers:
                for pf, par in prefetch_configs:
                    tput = measure_modyn(
                        setup,
                        workers=w,
                        prefetched_partitions=pf,
                        parallel_prefetch=par,
                        storage_threads=st,
                    )
                    rows.append(
                        {
                            "partition_size": ps,
                            "storage_threads": st,
                            "workers": w,
                            "prefetched_partitions": pf,
                            "parallel_prefetch": par,
                            "throughput": tput,
                        }
                    )
    return pd.DataFrame(rows)


def local_vs_modyn(
    spark: SparkSession,
    root: str,
    *,
    workload: str = "criteo",
    n_samples: int = 120_000,
    workers: tuple[int, ...] = (1, 4, 8, 16),
    best_config: dict | None = None,
) -> pd.DataFrame:
    """T2/T3 (Fig. 8): best Modyn config vs the local baseline per worker count."""
    if workload == "criteo":
        setup = build_criteo_setup(spark, root, n_samples=n_samples,
                                   partition_size=30_000)
        default_cfg = dict(prefetched_partitions=2, parallel_prefetch=1,
                           storage_threads=2)
    else:
        setup = build_cloc_setup(spark, root, n_samples=n_samples)
        default_cfg = dict(prefetched_partitions=2, parallel_prefetch=1,
                           storage_threads=1)
    cfg = best_config or default_cfg
    rows = []
    for w in workers:
        modyn = measure_modyn(setup, workers=w, **cfg)
        local = measure_local(setup, workers=w)
        rows.append(
            {
                "workers": w,
                "modyn_throughput": modyn,
                "local_throughput": local,
                "pct_of_local": 100.0 * modyn / local,
            }
        )
    return pd.DataFrame(rows)

"""T1 bench (paper Fig. 7): Criteo-lite end-to-end training throughput.

A representative subset of the §5.1 sweep — one benchmark per
(partition size, workers/prefetch/parallel, storage threads) cell. Each
cell's samples/s lands in ``extra_info``; ``jobs/table_criteo_throughput.py``
regenerates the full grid.
"""
import pytest

from benchmarks.conftest import CRITEO_BENCH_SAMPLES
from repro.experiments.throughput import measure_modyn

# (partition, workers, prefetched, parallel, storage_threads)
CELLS = [
    ("small", 1, 0, 1, 1),
    ("small", 1, 1, 1, 1),
    ("small", 4, 1, 1, 1),
    ("small", 8, 2, 1, 1),
    ("small", 16, 2, 1, 1),
    ("big", 1, 1, 1, 1),
    ("big", 4, 1, 1, 1),
    ("big", 8, 2, 1, 1),
    ("big", 16, 2, 1, 1),
    ("big", 1, 1, 1, 2),
    ("big", 16, 2, 1, 8),
]


@pytest.mark.parametrize(
    "partition,workers,prefetch,parallel,threads",
    CELLS,
    ids=[f"{p}-w{w}-pf{pf}-par{pa}-st{st}" for p, w, pf, pa, st in CELLS],
)
def test_criteo_throughput(
    benchmark, criteo_setups, partition, workers, prefetch, parallel, threads
):
    setup = criteo_setups[partition]

    def run():
        return measure_modyn(
            setup,
            workers=workers,
            prefetched_partitions=prefetch,
            parallel_prefetch=parallel,
            storage_threads=threads,
        )

    tput = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["samples_per_s"] = round(tput)
    benchmark.extra_info["n_samples"] = CRITEO_BENCH_SAMPLES
    assert tput > 0

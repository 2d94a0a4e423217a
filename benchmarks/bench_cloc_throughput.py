"""T3 bench (paper Fig. 8b): CLOC-lite compute-bound throughput.

Paper shape: throughput stagnates from ~4 workers (the simulated decode
+ device time dominate) and Modyn tracks the local baseline closely.
"""
import pytest

from repro.experiments.throughput import measure_local, measure_modyn

WORKERS = [1, 4, 8]


@pytest.mark.parametrize("workers", WORKERS, ids=[f"w{w}" for w in WORKERS])
def test_cloc_modyn(benchmark, cloc_setup, workers):
    def run():
        return measure_modyn(
            cloc_setup,
            workers=workers,
            prefetched_partitions=2,
            parallel_prefetch=1,
            storage_threads=1,
        )

    tput = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["samples_per_s"] = round(tput)


@pytest.mark.parametrize("workers", WORKERS, ids=[f"w{w}" for w in WORKERS])
def test_cloc_local(benchmark, cloc_setup, workers):
    tput = benchmark.pedantic(
        lambda: measure_local(cloc_setup, workers=workers), rounds=1, iterations=1
    )
    benchmark.extra_info["samples_per_s"] = round(tput)

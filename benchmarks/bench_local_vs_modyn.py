"""T2 bench (paper Fig. 8a): Modyn vs local sequential baseline, Criteo.

Paper shape: with a good configuration Modyn reaches 80-92 % of the
local throughput despite sample-level retrieval. Each cell stores its
samples/s in ``extra_info``; compare modyn-* against local-* rows.
"""
import pytest

from repro.experiments.throughput import measure_local, measure_modyn

WORKERS = [1, 4, 8, 16]


@pytest.mark.parametrize("workers", WORKERS, ids=[f"w{w}" for w in WORKERS])
def test_modyn_best_config(benchmark, criteo_setups, workers):
    setup = criteo_setups["big"]

    def run():
        return measure_modyn(
            setup,
            workers=workers,
            prefetched_partitions=2,
            parallel_prefetch=1,
            storage_threads=2,
        )

    tput = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["samples_per_s"] = round(tput)


@pytest.mark.parametrize("workers", WORKERS, ids=[f"w{w}" for w in WORKERS])
def test_local_baseline(benchmark, criteo_setups, workers):
    setup = criteo_setups["big"]
    tput = benchmark.pedantic(
        lambda: measure_local(setup, workers=workers), rounds=1, iterations=1
    )
    benchmark.extra_info["samples_per_s"] = round(tput)

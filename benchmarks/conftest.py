"""Shared benchmark fixtures: workload setups reused across benchmarks.

Benchmark data is smaller than the ``jobs/`` tables (SF guidance: tests
tiny, benches ~100 MB-scale) so the suite completes in minutes; the
``jobs/`` entrypoints regenerate the full tables.
"""
import pytest

from repro.experiments.throughput import (
    add_trigger_set,
    build_cloc_setup,
    build_criteo_setup,
)

CRITEO_BENCH_SAMPLES = 60_000
CLOC_BENCH_SAMPLES = 6_000


@pytest.fixture(scope="session")
def criteo_setups(spark, tmp_path_factory):
    """criteo-lite bench data with small (6k) and big (30k) partitions."""
    root = str(tmp_path_factory.mktemp("bench_criteo"))
    small = build_criteo_setup(
        spark, root, n_samples=CRITEO_BENCH_SAMPLES, partition_size=6_000
    )
    big = add_trigger_set(spark, root, small, partition_size=30_000)
    return {"small": small, "big": big}


@pytest.fixture(scope="session")
def cloc_setup(spark, tmp_path_factory):
    return build_cloc_setup(
        spark,
        str(tmp_path_factory.mktemp("bench_cloc")),
        n_samples=CLOC_BENCH_SAMPLES,
        partition_size=1_000,
    )

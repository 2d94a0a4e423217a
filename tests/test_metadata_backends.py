"""Tests for the selector metadata backends (paper §4.1.2)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.selector.metadata_backend import (
    LocalMetadataBackend,
    SparkMetadataBackend,
)


def _persist_batches(backend):
    backend.persist(0, np.arange(10), np.arange(10) % 3, np.zeros(10))
    backend.persist(0, np.arange(10, 15), np.arange(5) % 3, np.ones(5))
    backend.persist(1, np.arange(100, 120), np.arange(20) % 3, np.full(20, 2))


@pytest.fixture(params=["spark", "local"])
def backend(request, spark, tmp_path):
    if request.param == "spark":
        return SparkMetadataBackend(spark, str(tmp_path / "meta"))
    return LocalMetadataBackend(str(tmp_path / "meta"), n_threads=3)


class TestBackendContract:
    def test_persist_and_get_single_trigger(self, backend):
        _persist_batches(backend)
        pdf = backend.get([0])
        assert sorted(pdf["sample_key"]) == list(range(15))
        assert set(pdf["trigger_id"]) == {0}

    def test_get_multiple_triggers(self, backend):
        _persist_batches(backend)
        pdf = backend.get([0, 1])
        assert len(pdf) == 35
        assert set(pdf["trigger_id"]) == {0, 1}

    def test_count(self, backend):
        _persist_batches(backend)
        assert backend.count([0]) == 15
        assert backend.count([1]) == 20
        assert backend.count([0, 1]) == 35

    def test_labels_and_timestamps_roundtrip(self, backend):
        _persist_batches(backend)
        pdf = backend.get([0]).sort_values("sample_key")
        assert pdf["label"].tolist() == [k % 3 for k in range(10)] + [k % 3 for k in range(5)]
        assert pdf["timestamp"].tolist() == [0] * 10 + [1] * 5

    def test_reset_drops_one_bucket_only(self, backend):
        _persist_batches(backend)
        backend.reset(0)
        assert backend.count([0]) == 0
        assert backend.count([1]) == 20

    def test_empty_bucket(self, backend):
        assert backend.count([5]) == 0
        assert len(backend.get([5])) == 0


class TestSparkBackend:
    def test_bucket_is_physical_partition(self, spark, tmp_path):
        # the paper's per-trigger table partitioning: each trigger has its
        # own directory, so inserts never touch other triggers
        import os

        b = SparkMetadataBackend(spark, str(tmp_path / "meta"), pipeline_id="px")
        _persist_batches(b)
        root = str(tmp_path / "meta" / "pipeline=px")
        assert sorted(os.listdir(root)) == ["trigger_id=0", "trigger_id=1"]

    def test_sql_query_matches_duckdb(self, spark, tmp_path):
        b = SparkMetadataBackend(spark, str(tmp_path / "meta"))
        _persist_batches(b)
        df = (
            b.df([0, 1])
            .groupBy("trigger_id", "label")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            df,
            "SELECT trigger_id, label, count(*) AS n FROM seen GROUP BY trigger_id, label",
            seen=b.df([0, 1]),
        )

    def test_pipelines_isolated(self, spark, tmp_path):
        a = SparkMetadataBackend(spark, str(tmp_path / "meta"), pipeline_id="a")
        b = SparkMetadataBackend(spark, str(tmp_path / "meta"), pipeline_id="b")
        a.persist(0, np.arange(5), np.zeros(5), np.zeros(5))
        b.persist(0, np.arange(7), np.zeros(7), np.zeros(7))
        assert a.count([0]) == 5
        assert b.count([0]) == 7


class TestLocalBackend:
    def test_multithreaded_chunk_files_on_disk(self, tmp_path):
        import os

        b = LocalMetadataBackend(str(tmp_path / "meta"), n_threads=4)
        b.persist(0, np.arange(100), np.zeros(100), np.zeros(100))
        bucket = str(tmp_path / "meta" / "pipeline=p0" / "trigger_id=0")
        files = os.listdir(bucket)
        assert len(files) == 4  # one binary chunk per write thread

    def test_appends_accumulate(self, tmp_path):
        b = LocalMetadataBackend(str(tmp_path / "meta"), n_threads=2)
        b.persist(0, np.arange(10), np.zeros(10), np.zeros(10))
        b.persist(0, np.arange(10, 20), np.zeros(10), np.zeros(10))
        assert b.count([0]) == 20
        assert sorted(b.get([0])["sample_key"]) == list(range(20))

    def test_single_thread(self, tmp_path):
        b = LocalMetadataBackend(str(tmp_path / "meta"), n_threads=1)
        b.persist(0, np.arange(7), np.arange(7), np.arange(7))
        pdf = b.get([0]).sort_values("sample_key")
        assert pdf["label"].tolist() == list(range(7))

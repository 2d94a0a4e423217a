"""End-to-end pipeline tests (paper §3.4 data flow, §5.2 harness)."""
import numpy as np
import pytest

from repro.core.config import PipelineConfig
from repro.core.pipeline import Pipeline
from tests.conftest import (
    CLOC_CLASSES,
    CLOC_DIM,
    CLOC_PER_YEAR,
    CLOC_YEARS_SMALL,
    CRITEO_N,
)


def _cloc_config(pipeline_id, **overrides):
    d = {
        "pipeline_id": pipeline_id,
        "model": {
            "id": "SoftmaxRegression",
            "config": {"dim": CLOC_DIM, "n_classes": CLOC_CLASSES, "seed": 0},
        },
        "data": {"bytes_parser_function": "cloc"},
        "trigger": {
            "id": "TimeTrigger",
            "trigger_config": {"every": 1, "start_timestamp": CLOC_YEARS_SMALL[0]},
        },
        "selection": {
            "name": "NewDataStrategy",
            "storage_backend": "local",
            "reset_after_trigger": True,
            "partition_size": 50,
        },
        "training": {
            "batch_size": 32,
            "epochs": 2,
            "lr": 0.05,
            "dataloader_workers": 2,
            "prefetched_partitions": 1,
        },
        "evaluation": {"metrics": ["Accuracy"], "matrix": True},
    }
    for k, v in overrides.items():
        d[k] = {**d.get(k, {}), **v} if isinstance(v, dict) else v
    return PipelineConfig.from_dict(d)


@pytest.fixture(scope="module")
def full_run(spark, cloc_storage, tmp_path_factory):
    """One full-data pipeline run over the 3-year cloc_lite stream."""
    cfg = _cloc_config("full")
    pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path_factory.mktemp("wd")))
    return pipe.run_experiment(announce_batch_size=50)


class TestFullDataPipeline:
    def test_one_trigger_per_year(self, full_run):
        assert full_run.num_triggers == len(CLOC_YEARS_SMALL)

    def test_trigger_sets_cover_each_year(self, full_run):
        for t, info in enumerate(full_run.trigger_infos):
            assert info.num_samples == CLOC_PER_YEAR
            expect = set(range(t * CLOC_PER_YEAR, (t + 1) * CLOC_PER_YEAR))
            assert set(full_run.seen_keys[info.trigger_id].tolist()) == expect

    def test_trigger_timestamps_are_years(self, full_run):
        assert [
            full_run.trigger_timestamps[i.trigger_id] for i in full_run.trigger_infos
        ] == list(CLOC_YEARS_SMALL)

    def test_models_stored_per_trigger(self, full_run):
        assert full_run.model_storage.stored_triggers == [0, 1, 2]

    def test_train_results_counts(self, full_run):
        for res in full_run.train_results:
            assert res.num_samples == 2 * CLOC_PER_YEAR  # 2 epochs

    def test_accuracy_matrix_shape(self, full_run):
        mat = full_run.accuracy_matrix
        assert mat.shape == (3, 3)
        assert ((mat >= 0) & (mat <= 1)).all().all()

    def test_models_learn_better_than_chance(self, full_run):
        # diagonal: model evaluated on the year it just trained on
        mat = full_run.accuracy_matrix
        diag = np.diag(mat.to_numpy())
        assert diag.mean() > 3.0 / CLOC_CLASSES  # >> 1/8 random guessing

    def test_evaluations_recorded(self, full_run):
        assert set(full_run.evaluations) == {0, 1, 2}
        for v in full_run.evaluations.values():
            assert "Accuracy" in v


class TestPipelineVariants:
    def test_uniform_random_pipeline_halves_trigger_set(
        self, spark, cloc_storage, tmp_path
    ):
        cfg = _cloc_config(
            "uniform",
            selection={
                "name": "UniformRandomStrategy",
                "storage_backend": "spark",
                "reset_after_trigger": True,
                "partition_size": 50,
                "presampling_config": {"fraction": 0.5},
            },
            evaluation=None,
        )
        pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path / "wd"))
        result = pipe.run_experiment(announce_batch_size=50)
        assert result.num_triggers == 3
        for info in result.trigger_infos:
            assert info.num_samples == CLOC_PER_YEAR // 2

    def test_gradnorm_stb_pipeline(self, spark, cloc_storage, tmp_path):
        cfg = _cloc_config(
            "gradnorm",
            selection={
                "name": "NewDataStrategy",
                "storage_backend": "local",
                "reset_after_trigger": True,
                "partition_size": 50,
                "downsampling_config": {
                    "name": "GradNormDownsampler",
                    "ratio": 0.5,
                    "mode": "StB",
                    "score_parallelism": 2,
                },
            },
            evaluation=None,
        )
        pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path / "wd"))
        result = pipe.run_experiment(announce_batch_size=50)
        assert result.num_triggers == 3
        for res in result.train_results:
            # scoring saw the full year; training stepped on half (x2 epochs)
            assert res.num_samples == CLOC_PER_YEAR
            assert res.num_trained_samples == 2 * (CLOC_PER_YEAR // 2)

    def test_from_scratch_vs_finetune_differ(self, spark, cloc_storage, tmp_path):
        runs = {}
        for name, prev in (("ft", True), ("scratch", False)):
            cfg = _cloc_config(
                name, training={"use_previous_model": prev, "batch_size": 32,
                                "epochs": 2, "lr": 0.05}, evaluation=None,
            )
            pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path / name))
            runs[name] = pipe.run_experiment(announce_batch_size=50)
        w_ft = runs["ft"].model_storage.load(2)["W"]
        w_scratch = runs["scratch"].model_storage.load(2)["W"]
        assert not np.allclose(w_ft, w_scratch)

    def test_incremental_model_storage_policy(self, spark, cloc_storage, tmp_path):
        cfg = _cloc_config("inc", model_storage={"full_every": 3}, evaluation=None)
        pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path / "wd"))
        result = pipe.run_experiment(announce_batch_size=50)
        kinds = [result.model_storage.info(t).kind for t in (0, 1, 2)]
        assert kinds == ["full", "delta", "delta"]

    def test_amount_trigger_pipeline(self, spark, cloc_storage, tmp_path):
        cfg = _cloc_config(
            "amount",
            trigger={"id": "DataAmountTrigger", "trigger_config": {"data_points_for_trigger": 45}},
            evaluation=None,
        )
        pipe = Pipeline(spark, cfg, cloc_storage, str(tmp_path / "wd"))
        result = pipe.run_experiment(announce_batch_size=50)
        # 180 samples / 45 per trigger = 4 triggers, nothing left over
        assert result.num_triggers == 4
        assert all(i.num_samples == 45 for i in result.trigger_infos)

    def test_criteo_pipeline_with_dlrm(self, spark, criteo_storage, tmp_path):
        cfg = PipelineConfig.from_dict(
            {
                "pipeline_id": "criteo",
                "model": {"id": "DlrmLite", "config": {"seed": 0}},
                "data": {"bytes_parser_function": "criteo"},
                "trigger": {
                    "id": "DataAmountTrigger",
                    "trigger_config": {"data_points_for_trigger": 1500},
                },
                "selection": {
                    "name": "NewDataStrategy",
                    "storage_backend": "local",
                    "partition_size": 500,
                },
                "training": {"batch_size": 256, "lr": 0.1, "dataloader_workers": 2},
            }
        )
        pipe = Pipeline(spark, cfg, criteo_storage, str(tmp_path / "wd"))
        result = pipe.run_experiment(announce_batch_size=600)
        assert result.num_triggers == CRITEO_N // 1500
        assert result.train_results[0].num_samples == 1500

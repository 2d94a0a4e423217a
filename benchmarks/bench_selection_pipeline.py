"""T4 bench (paper §5.2): end-to-end selection pipelines over 11 triggers.

One benchmark per data-selection strategy, running the full experiment-
mode replay (storage announce -> trigger -> select -> train -> store ->
evaluate) over the drifting cloc-lite stream at reduced scale. The
accuracy shape assertions guard T4's qualitative findings; the
full-scale numbers come from ``jobs/table_selection_accuracy.py``.
"""
import numpy as np
import pytest

from repro.experiments.selection import build_cloc_stream, run_one_pipeline, year_matrix

PER_YEAR = 150


@pytest.fixture(scope="module")
def cloc_stream(spark, tmp_path_factory):
    root = str(tmp_path_factory.mktemp("bench_sel"))
    storage = build_cloc_stream(spark, root, per_year=PER_YEAR)
    return storage, root


@pytest.mark.parametrize("name", ["full", "uniform", "gradnorm"])
def test_selection_pipeline(benchmark, spark, cloc_stream, name):
    storage, root = cloc_stream

    def run():
        return run_one_pipeline(
            spark, storage, root + f"/bench_{name}", name, per_year=PER_YEAR
        )

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result.num_triggers == 11
    mat = year_matrix(result)
    # model accuracy must beat 32-class chance on its own final year
    assert mat.loc[2014, 2014] > 3 / 32
    benchmark.extra_info["mean_final_accuracy"] = round(
        float(np.mean(mat.loc[2014])), 4
    )
    benchmark.extra_info["triggers"] = result.num_triggers

"""Figure 15 benchmark: Kaggle schema-drift case study (11 tasks)."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import fig15


@pytest.mark.benchmark(group="fig15")
def test_fig15_kaggle_drift(benchmark, spark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: fig15(spark, prep_enterprise), rounds=1, iterations=1
    )
    save_table(results_dir, "fig15", df.to_string(index=False))
    detected = int(df.drift_detected.sum())
    benchmark.extra_info["detected_tasks"] = detected
    benchmark.extra_info["false_positives"] = int(df.false_positive.sum())
    # paper: detected in 8/11 tasks, no false positives; our three
    # pattern-identical swaps are invisible to any syntactic validator
    assert len(df) == 11
    assert detected == 8
    assert df.false_positive.sum() == 0
    undetectable = {"WestNile", "WalmartTrips", "HomeDepot"}
    assert set(df[~df.drift_detected].task) == undetectable
    # drift hurts model quality on most tasks
    assert (df.rel_quality_pct < 100).mean() > 0.6

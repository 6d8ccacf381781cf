"""Table 1 benchmark: corpus generation + Spark characteristic stats."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import table1


@pytest.mark.benchmark(group="table1")
def test_table1_corpus_stats(benchmark, spark, results_dir):
    df = benchmark.pedantic(lambda: table1(spark), rounds=1, iterations=1)
    save_table(results_dir, "table1", df.to_string(index=False))
    row = df[df.corpus == "enterprise"].iloc[0]
    benchmark.extra_info["enterprise_cols"] = int(row.n_cols)
    benchmark.extra_info["enterprise_files"] = int(row.n_files)
    assert df.shape[0] == 2
    assert (df.n_cols > df.n_files).all()

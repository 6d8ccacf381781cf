"""Table 2 benchmark: programmatic vs ground-truth evaluation."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import table2


@pytest.mark.benchmark(group="table2")
def test_table2_quality(benchmark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: table2(prep_enterprise), rounds=1, iterations=1
    )
    save_table(results_dir, "table2", df.to_string(index=False))
    prog = df.iloc[0]
    truth = df.iloc[1]
    benchmark.extra_info["programmatic_precision"] = float(prog.precision)
    benchmark.extra_info["truth_precision"] = float(truth.precision)
    # the paper: programmatic evaluation under-estimates true quality,
    # so ground-truth adjustments can only improve both metrics
    assert truth.precision >= prog.precision
    assert truth.recall >= prog.recall
    # and both evaluations agree closely (validity of the methodology)
    assert abs(truth.precision - prog.precision) < 0.1

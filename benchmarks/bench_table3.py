"""Table 3 benchmark: simulated user study vs FMDV-VH."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import table3


@pytest.mark.benchmark(group="table3")
def test_table3_user_study(benchmark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: table3(prep_enterprise), rounds=1, iterations=1
    )
    save_table(results_dir, "table3", df.to_string(index=False))
    by = df.set_index("who")
    benchmark.extra_info["fmdv_vh_precision"] = float(by.loc["FMDV-VH", "precision"])
    prog_rows = by.drop("FMDV-VH")
    # the paper's finding: the algorithm beats every hand-written regex
    assert by.loc["FMDV-VH", "precision"] >= prog_rows["precision"].max()
    assert by.loc["FMDV-VH", "recall"] >= prog_rows["recall"].max()
    # and answers in well under a second per column
    assert by.loc["FMDV-VH", "avg_time_sec"] < 1.0

"""Figure 10 benchmark: accuracy of all 16 methods + upper bounds,
on the enterprise and government corpora."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import fig10


def _run(benchmark, prep, results_dir, name):
    df = benchmark.pedantic(lambda: fig10(prep), rounds=1, iterations=1)
    save_table(results_dir, name, df.to_string(index=False))
    by = df.set_index("method")
    benchmark.extra_info["fmdv_vh_precision"] = float(by.loc["FMDV-VH", "precision"])
    benchmark.extra_info["fmdv_vh_recall"] = float(by.loc["FMDV-VH", "recall"])
    benchmark.extra_info["tfdv_precision"] = float(by.loc["TFDV", "precision"])
    return df


@pytest.mark.benchmark(group="fig10")
def test_fig10_enterprise(benchmark, prep_enterprise, results_dir):
    df = _run(benchmark, prep_enterprise, results_dir, "fig10_enterprise")
    by = df.set_index("method")
    # the paper's headline shape
    assert by.loc["FMDV-VH", "f1"] == by["f1"].max()
    assert by.loc["FMDV-VH", "f1"] >= by.loc["FMDV-H", "f1"]
    assert by.loc["FMDV-H", "f1"] >= by.loc["FMDV", "f1"]
    assert by.loc["TFDV", "precision"] < 0.3   # >90% FP columns
    assert by.loc["Deequ-Fra", "precision"] > by.loc["TFDV", "precision"]


@pytest.mark.benchmark(group="fig10")
def test_fig10_government(benchmark, prep_government, results_dir):
    df = _run(benchmark, prep_government, results_dir, "fig10_government")
    by = df.set_index("method")
    fmdv_rows = by.loc[["FMDV", "FMDV-V", "FMDV-H", "FMDV-VH"]]
    others = by.drop(
        ["FMDV", "FMDV-V", "FMDV-H", "FMDV-VH", "FD-UB", "AD-UB"]
    )
    # FMDV variants remain the best family on the harder corpus
    assert fmdv_rows["f1"].max() == by["f1"].max()
    assert others["f1"].max() <= fmdv_rows["f1"].max()

"""Figure 12 benchmark: FMDV sensitivity to r, m, tau, theta."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import fig12


@pytest.mark.benchmark(group="fig12")
def test_fig12_sensitivity(benchmark, spark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: fig12(spark, prep_enterprise), rounds=1, iterations=1
    )
    save_table(results_dir, "fig12", df.to_string(index=False))

    def pick(knob, value, method):
        row = df[(df.knob == knob) & (df.value == value) & (df.method == method)]
        return row.iloc[0]

    # 12(a): r=0 is the degenerate strict point — recall collapses
    assert pick("r", 0.0, "FMDV-VH").recall < pick("r", 0.1, "FMDV-VH").recall
    # 12(c): without vertical cuts, a small tau costs recall;
    # with vertical cuts the algorithm is insensitive to tau
    assert (
        pick("tau", 8, "FMDV-H").recall
        <= pick("tau", 13, "FMDV-H").recall
    )
    vh_gap = abs(
        pick("tau", 8, "FMDV-VH").recall - pick("tau", 13, "FMDV-VH").recall
    )
    h_gap = (
        pick("tau", 13, "FMDV-H").recall - pick("tau", 8, "FMDV-H").recall
    )
    benchmark.extra_info["tau_gap_vh"] = round(vh_gap, 3)
    benchmark.extra_info["tau_gap_h"] = round(h_gap, 3)
    assert vh_gap <= h_gap + 1e-9

"""Figure 11 benchmark: case-by-case F1 of competitive methods."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import FIG11_METHODS, fig11


@pytest.mark.benchmark(group="fig11")
def test_fig11_case_by_case(benchmark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: fig11(prep_enterprise, n_cases=100), rounds=1, iterations=1
    )
    save_table(results_dir, "fig11", df.to_string(index=False))
    means = {m: df[m].mean() for m in FIG11_METHODS}
    benchmark.extra_info.update({f"mean_f1_{k}": round(v, 3) for k, v in means.items()})
    # FMDV-VH dominates the other methods on average (paper Fig 11)
    assert means["FMDV-VH"] == max(means.values())

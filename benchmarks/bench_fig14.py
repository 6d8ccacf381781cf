"""Figure 14 benchmark: per-query latency + offline index build times."""
import time

import pytest

from benchmarks.conftest import save_table
from repro.core.index import build_index
from repro.experiments import fig14


@pytest.mark.benchmark(group="fig14")
def test_fig14_latency(benchmark, prep_enterprise, results_dir):
    df = benchmark.pedantic(
        lambda: fig14(prep_enterprise), rounds=1, iterations=1
    )
    save_table(results_dir, "fig14", df.to_string(index=False))
    ms = df.set_index("method")["ms_per_column"]
    benchmark.extra_info.update(
        {f"ms_{k}": float(v) for k, v in ms.items()}
    )
    # the architecture claim: indexed FMDV answers in milliseconds
    # (paper: tens of ms) while the no-index corpus scan is orders of
    # magnitude slower.  The paper's 6-7s profiler latencies came from
    # the authors' original implementations; our lean reimplementations
    # are not comparable on absolute time (EXPERIMENTS.md).
    fmdv_worst = ms[["FMDV", "FMDV-V", "FMDV-H", "FMDV-VH"]].max()
    assert fmdv_worst < 100.0
    assert fmdv_worst * 50 < ms["FMDV (no-index)"]


@pytest.mark.benchmark(group="fig14")
def test_fig14_offline_index_build(benchmark, prep_enterprise, results_dir):
    """§5.3 'Efficiency': offline job latency, tau=8 vs tau=13."""
    df = prep_enterprise.corpus.df

    def build_both():
        t0 = time.perf_counter()
        build_index(df, tau=8)
        t8 = time.perf_counter() - t0
        t0 = time.perf_counter()
        build_index(df, tau=13)
        t13 = time.perf_counter() - t0
        return t8, t13

    t8, t13 = benchmark.pedantic(build_both, rounds=1, iterations=1)
    save_table(
        results_dir,
        "fig14_offline",
        f"offline index build: tau=8 {t8:.1f}s, tau=13 {t13:.1f}s "
        f"(paper: ~1h vs ~3h on a 10-node cluster over 7M columns)",
    )
    benchmark.extra_info["build_s_tau8"] = round(t8, 2)
    benchmark.extra_info["build_s_tau13"] = round(t13, 2)
    # the paper's shape: a smaller tau makes the offline job cheaper
    assert t8 <= t13 * 1.2

"""Figure 13 benchmark: pattern distribution in the offline index."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import fig13


@pytest.mark.benchmark(group="fig13")
def test_fig13_pattern_analysis(benchmark, prep_enterprise, results_dir):
    by_len, by_cov = benchmark.pedantic(
        lambda: fig13(prep_enterprise), rounds=1, iterations=1
    )
    save_table(
        results_dir,
        "fig13",
        "patterns by token length\n"
        + by_len.to_string(index=False)
        + "\n\npatterns by coverage bucket\n"
        + by_cov.to_string(index=False),
    )
    benchmark.extra_info["index_patterns"] = int(by_len.n_patterns.sum())
    # 13(a): mid-length patterns are the most common band
    peak = by_len.sort_values("n_patterns").iloc[-1].token_len
    assert 3 <= peak <= 13
    # 13(b): the "head" (highest-coverage buckets) holds few patterns —
    # the part of the paper's power-law claim that survives our scale
    # (a curated ~3K-column lake has no long tail of one-off patterns;
    # see EXPERIMENTS.md)
    head = by_cov[by_cov.cov_bucket >= by_cov.cov_bucket.max() / 4]
    assert head.n_patterns.sum() < 0.1 * by_cov.n_patterns.sum()

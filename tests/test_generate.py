"""Unit tests for pattern generation (Algorithm 1, H(C), P(D))."""
import pytest

from repro.patterns.generate import (
    column_candidates,
    enumerate_consistent,
    hypothesis_patterns,
    skeleton_groups,
)
from repro.patterns.pattern import parse_pattern

DATES = ["9/12/2019", "10/2/2019", "1/31/2020", "12/5/2018"]
MONTH_DATES = ["Mar 01 2019", "Mar 05 2019", "Mar 30 2019"]
GUIDS = [
    "0f8fad5b-d9cb-469f-a165-70867728950e",
    "7c9e6679-7425-40de-944b-e07fc1f90ae7",
    "16fd2706-8baf-433b-82eb-8c7fada847da",
]


def canon(patterns):
    return {p.canonical() for p in patterns}


class TestHypothesisPatterns:
    def test_contains_ideal_date_pattern(self):
        got = canon(hypothesis_patterns(DATES))
        assert "<digit>+/<digit>+/<digit>{4}" in got

    def test_contains_all_general_variant(self):
        got = canon(hypothesis_patterns(DATES))
        assert "<digit>+/<digit>+/<digit>+" in got

    def test_excludes_fixed_len_when_lengths_vary(self):
        # months are 1-2 digits, so <digit>{1} / <digit>{2} first part invalid
        got = canon(hypothesis_patterns(DATES))
        assert not any(s.startswith("<digit>{1}/") for s in got)
        assert not any(s.startswith("<digit>{2}/") for s in got)

    def test_fixed_len_present_when_consistent(self):
        got = canon(hypothesis_patterns(MONTH_DATES))
        assert "<letter>{3} <digit>{2} <digit>{4}" in got

    def test_constant_segment_still_generalizable(self):
        # "Mar" is constant in the sample but must offer <letter>{3}
        got = canon(hypothesis_patterns(MONTH_DATES))
        assert any(s.startswith("<letter>{3} ") for s in got)
        assert any(s.startswith("Mar ") for s in got)

    def test_every_hypothesis_matches_every_value(self):
        for p in hypothesis_patterns(DATES):
            for v in DATES:
                assert p.matches(v), (p.canonical(), v)

    def test_mixed_skeletons_yield_empty(self):
        assert hypothesis_patterns(["9/12/2019", "hello world"]) == []
        assert hypothesis_patterns(["abc", "a-c"]) == []

    def test_empty_string_yields_empty(self):
        assert hypothesis_patterns(["", "abc"]) == []
        assert hypothesis_patterns([]) == []

    def test_guid_alnum_generalization(self):
        got = canon(hypothesis_patterns(GUIDS))
        assert (
            "<alnum>{8}-<alnum>{4}-<alnum>{4}-<alnum>{4}-<alnum>{12}" in got
        )

    def test_ordered_general_first(self):
        pats = hypothesis_patterns(MONTH_DATES)
        # first enumerated pattern is the all-general one (rank 0)
        assert pats[0].canonical() == "<letter>+ <digit>+ <digit>+"

    def test_max_patterns_cap(self):
        assert len(hypothesis_patterns(MONTH_DATES)) > 3
        pats = hypothesis_patterns(MONTH_DATES, max_patterns=3)
        assert len(pats) == 3

    def test_symbol_delimiter_pinned_when_stable(self):
        got = canon(hypothesis_patterns(["a-b", "c-d"]))
        assert all("-" in s for s in got)

    def test_symbol_generalized_when_unstable(self):
        got = canon(hypothesis_patterns(["a-b", "c/d"]))
        assert "<letter>{1}<sym>{1}<letter>{1}" in got


class TestSkeletonGroups:
    def test_groups_by_shape(self):
        # "1/2", "3/4" and "N/A" all share skeleton A-S-A; "abc" is A.
        groups = skeleton_groups(["1/2", "3/4", "abc", "N/A"])
        assert len(groups) == 2
        # genuinely different shapes split
        assert len(skeleton_groups(["1/2", "hello world x"])) == 2

    def test_preserves_values(self):
        groups = skeleton_groups(["1/2", "3/4"])
        (vals,) = groups.values()
        assert vals == ["1/2", "3/4"]


class TestColumnCandidates:
    def test_pure_column_zero_impurity(self):
        cands = column_candidates(DATES * 10)
        assert cands, "should enumerate candidates"
        assert all(imp == 0.0 for _, imp in cands)

    def test_impure_column_nonzero_impurity(self):
        # 10% of values are from another domain (paper Example 3)
        values = DATES * 9 + ["not_a_date!!", "also bad", "stillbad", "x y"]
        cands = dict(
            (p.canonical(), imp) for p, imp in column_candidates(values)
        )
        ideal = "<digit>+/<digit>+/<digit>{4}"
        assert ideal in cands
        assert cands[ideal] == pytest.approx(4 / 40)

    def test_small_groups_dropped_by_coverage(self):
        values = DATES * 20 + ["odd-one-out"]
        pats = canon(p for p, _ in column_candidates(values, min_group_frac=0.1))
        assert not any("odd" in s for s in pats)

    def test_wide_columns_skipped_by_tau(self):
        wide = ["a-b-c-d-e-f-g-h-i-j"] * 5  # 19 tokens > tau=13
        assert column_candidates(wide, tau=13) == []
        assert column_candidates(wide, tau=19) != []

    def test_impurity_example_from_paper(self):
        # Figure 6: h1 = 12-hour timestamps, 2 of 12 values have PM
        am = [f"9/12/2019 9:0{i}:45 AM" for i in range(6)]
        am += [f"9/12/2019 10:0{i}:45 AM" for i in range(4)]
        pm = ["9/12/2019 12:01:32 PM", "9/12/2019 12:21:14 PM"]
        col = am + pm
        cands = {p.canonical(): imp for p, imp in column_candidates(col)}
        h5 = "<digit>+/<digit>+/<digit>{4} <digit>+:<digit>{2}:<digit>{2} <letter>{2}"
        assert cands[h5] == pytest.approx(0.0)

    def test_cross_group_matching_counted(self):
        # pattern from the letters group also matches values in another
        # group only if regex-compatible; "N/A" (A S A) vs "abc" (A)
        values = ["abc"] * 8 + ["de"] * 2
        cands = {p.canonical(): imp for p, imp in column_candidates(values)}
        assert cands["<letter>+"] == pytest.approx(0.0)

    def test_empty_input(self):
        assert column_candidates([]) == []

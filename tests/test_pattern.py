"""Unit tests for Pattern / Token canonical form, parsing, matching."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.patterns.pattern import Pattern, Token, parse_pattern
from repro.patterns.tokens import ALNUM, DIGIT, LETTER, SYMBOL


def P(*tokens):
    return Pattern.of(tokens)


class TestCanonical:
    def test_digit_fixed(self):
        assert Token.of(DIGIT, 2).canonical() == "<digit>{2}"

    def test_digit_plus(self):
        assert Token.of(DIGIT).canonical() == "<digit>+"

    def test_const_plain(self):
        assert Token.const("AM").canonical() == "AM"

    def test_const_escapes(self):
        assert Token.const("a<b\\c").canonical() == "a\\<b\\\\c"

    def test_pattern_concat_form(self):
        p = P(Token.of(DIGIT), Token.const("/"), Token.of(DIGIT, 4))
        assert p.canonical() == "<digit>+/<digit>{4}"


class TestParseRoundTrip:
    @pytest.mark.parametrize(
        "canonical",
        [
            "<digit>+/<digit>+/<digit>{4}",
            "<digit>{4}-<digit>{2}-<digit>{2}",
            "<letter>{3} <digit>{2} <digit>{4}",
            "<alnum>{8}-<alnum>{4}-<alnum>{4}-<alnum>{4}-<alnum>{12}",
            "<num>",
            "<sym>+<letter>+",
            "Const\\<weird\\\\text<digit>+",
        ],
    )
    def test_round_trip(self, canonical):
        assert parse_pattern(canonical).canonical() == canonical

    def test_missing_quantifier_raises(self):
        with pytest.raises(ValueError):
            parse_pattern("<digit>")


class TestMatching:
    def test_date_pattern_matches_unseen_month(self):
        p = parse_pattern("<letter>{3} <digit>{2} <digit>{4}")
        assert p.matches("Mar 01 2019")
        assert p.matches("Apr 01 2019")
        assert not p.matches("March 01 2019")

    def test_fixed_digit_rejects_longer(self):
        p = parse_pattern("<digit>{2}")
        assert p.matches("09")
        assert not p.matches("123")
        assert not p.matches("9")

    def test_num_matches_float_and_negative(self):
        p = parse_pattern("<num>")
        assert p.matches("12")
        assert p.matches("0.1")
        assert p.matches("-3.25")
        assert not p.matches("1.2.3")

    def test_alnum_matches_hex(self):
        p = parse_pattern("<alnum>{8}")
        assert p.matches("0f8fad5b")
        assert not p.matches("0f8f-d5b")

    def test_anchored_full_match(self):
        p = parse_pattern("<digit>+")
        assert not p.matches("12a")
        assert not p.matches("a12")

    def test_const_regex_escaping(self):
        p = P(Token.const("a.b("), Token.of(DIGIT))
        assert p.matches("a.b(5")
        assert not p.matches("aXb(5")

    def test_sym_class(self):
        p = parse_pattern("<sym>+")
        assert p.matches("-/:")
        assert not p.matches("a")

    def test_concat(self):
        p = parse_pattern("<digit>{2}").concat(parse_pattern(":<digit>{2}"))
        assert p.canonical() == "<digit>{2}:<digit>{2}"
        assert p.matches("09:30")


class TestHypothesisProperties:
    @given(st.text(alphabet=st.characters(codec="ascii"), min_size=1, max_size=20))
    def test_const_pattern_round_trips_and_matches_itself(self, s):
        p = P(Token.const(s))
        assert parse_pattern(p.canonical()).canonical() == p.canonical()
        assert p.matches(s)

    @given(st.integers(min_value=1, max_value=12))
    def test_alnum_k_matches_any_k_alnum(self, k):
        p = P(Token.of(ALNUM, k))
        assert p.matches("a1" * (k // 2) + "z" * (k % 2))

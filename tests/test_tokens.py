"""Unit tests for the lexer (repro.patterns.tokens)."""
import pytest

from repro.patterns.tokens import (
    ALNUM,
    DIGIT,
    LETTER,
    SYMBOL,
    Run,
    lex,
    segments,
    skeleton,
    token_count,
)


class TestLex:
    def test_empty(self):
        assert lex("") == []

    def test_single_digit_run(self):
        assert lex("2019") == [Run(DIGIT, "2019")]

    def test_single_letter_run(self):
        assert lex("March") == [Run(LETTER, "March")]

    def test_symbol_run_groups_consecutive_symbols(self):
        assert lex("://") == [Run(SYMBOL, "://")]

    def test_date(self):
        assert lex("9/12/2019") == [
            Run(DIGIT, "9"),
            Run(SYMBOL, "/"),
            Run(DIGIT, "12"),
            Run(SYMBOL, "/"),
            Run(DIGIT, "2019"),
        ]

    def test_mixed_alnum_alternates(self):
        assert lex("a3f") == [Run(LETTER, "a"), Run(DIGIT, "3"), Run(LETTER, "f")]

    def test_whitespace_is_symbol(self):
        assert lex("a b")[1] == Run(SYMBOL, " ")

    def test_unicode_letters(self):
        assert lex("naïve")[0].cls == LETTER


class TestTokenCount:
    @pytest.mark.parametrize(
        "value,count",
        [
            ("2019", 1),
            ("9/12/2019", 5),
            ("9:07:45 AM", 7),
            ("Mar 01 2019", 5),
            ("", 0),
        ],
    )
    def test_counts(self, value, count):
        assert token_count(value) == count


class TestSegments:
    def test_alnum_grouping(self):
        segs = segments("a3f-42")
        assert [s.cls for s in segs] == [ALNUM, SYMBOL, ALNUM]
        assert segs[0].text == "a3f"
        assert segs[2].text == "42"

    def test_guid_segments(self):
        segs = segments("0f8fad5b-d9cb-469f-a165-70867728950e")
        assert [s.cls for s in segs] == [ALNUM, SYMBOL] * 4 + [ALNUM]

    def test_skeleton_equality_across_mixed_hex(self):
        # Different letter/digit interleavings, same level-1 skeleton.
        assert skeleton("a1b2-c3") == skeleton("9999-zz")

    def test_skeleton_differs_on_symbols(self):
        assert skeleton("1/2") == skeleton("3-4")  # both A S A
        assert skeleton("1/2") != skeleton("12")

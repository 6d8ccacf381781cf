"""Tests for the MSA substrate (paper §3)."""
import pytest

from repro.core.align import GAP_TOKEN, gap_free, greedy_msa, needleman_wunsch


class TestNeedlemanWunsch:
    def test_identical_sequences_no_gaps(self):
        a, b, score = needleman_wunsch(list("DSDSD"), list("DSDSD"))
        assert a == b == list("DSDSD")
        assert score == 10.0

    def test_single_insertion_gets_one_gap(self):
        a, b, _ = needleman_wunsch(list("DSD"), list("DSSD"))
        assert len(a) == len(b) == 4
        assert a.count(GAP_TOKEN) == 1
        assert b.count(GAP_TOKEN) == 0

    def test_empty_vs_nonempty(self):
        a, b, score = needleman_wunsch([], list("DL"))
        assert a == [GAP_TOKEN, GAP_TOKEN]
        assert b == list("DL")
        assert score == -2.0

    def test_alignment_preserves_sequences(self):
        x, y = list("DLSDL"), list("DSL")
        a, b, _ = needleman_wunsch(x, y)
        assert [t for t in a if t is not GAP_TOKEN] == x
        assert [t for t in b if t is not GAP_TOKEN] == y

    def test_mismatch_preferred_over_double_gap(self):
        a, b, score = needleman_wunsch(list("DS"), list("DL"))
        # aligning S against L (mismatch -2) beats two gaps (-2) or not;
        # either way lengths stay 2 and sequences are preserved
        assert len(a) == len(b)


class TestGreedyMSA:
    def test_trivial_case_identical(self):
        # paper Example 7: identical token sequences align trivially
        seqs = [list("DSDSD")] * 5
        aligned = greedy_msa(seqs)
        assert gap_free(aligned)
        assert all(row == list("DSDSD") for row in aligned)

    def test_empty_input(self):
        assert greedy_msa([]) == []

    def test_single_sequence(self):
        assert greedy_msa([list("DL")]) == [list("DL")]

    def test_gapped_alignment_same_width(self):
        seqs = [list("DSD"), list("DSSD"), list("DSD")]
        aligned = greedy_msa(seqs)
        widths = {len(row) for row in aligned}
        assert len(widths) == 1
        assert not gap_free(aligned)

    def test_rows_preserve_content(self):
        seqs = [list("DLD"), list("DD"), list("DLLD")]
        aligned = greedy_msa(seqs)
        for row, seq in zip(aligned, seqs):
            assert [t for t in row if t is not GAP_TOKEN] == seq

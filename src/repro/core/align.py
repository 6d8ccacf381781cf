"""Multi-sequence alignment over token-class sequences (paper §3).

The paper tokenizes each value into coarse token classes and runs MSA
[22] before vertical cuts, greedily aligning one sequence at a time
(optimal MSA being NP-hard [42]).  This module implements that
substrate: pairwise Needleman–Wunsch over token classes and greedy
progressive alignment against a growing profile.

For homogeneous machine-generated columns the alignment is trivial
(identical sequences, no gaps) — the paper's Example 7 — and our
pattern language has no optional tokens, so FMDV-V only consumes
gap-free alignments; values that need gaps are the business of
horizontal cuts.  The general aligner is still exercised directly by
its tests and used to compute the aligned view in the vertical solver.
"""
from __future__ import annotations

from typing import List, Optional, Sequence, Tuple

MATCH = 2.0
MISMATCH = -2.0
GAP = -1.0

#: gap marker in aligned outputs
GAP_TOKEN = None


def needleman_wunsch(
    a: Sequence[str], b: Sequence[str]
) -> Tuple[List[Optional[str]], List[Optional[str]], float]:
    """Global pairwise alignment of two token-class sequences.

    Returns (aligned_a, aligned_b, score) with ``None`` as the gap.
    """
    n, m = len(a), len(b)
    score = [[0.0] * (m + 1) for _ in range(n + 1)]
    for i in range(1, n + 1):
        score[i][0] = i * GAP
    for j in range(1, m + 1):
        score[0][j] = j * GAP
    for i in range(1, n + 1):
        for j in range(1, m + 1):
            diag = score[i - 1][j - 1] + (
                MATCH if a[i - 1] == b[j - 1] else MISMATCH
            )
            up = score[i - 1][j] + GAP
            left = score[i][j - 1] + GAP
            score[i][j] = max(diag, up, left)
    # traceback
    out_a: List[Optional[str]] = []
    out_b: List[Optional[str]] = []
    i, j = n, m
    while i > 0 or j > 0:
        if (
            i > 0
            and j > 0
            and score[i][j]
            == score[i - 1][j - 1]
            + (MATCH if a[i - 1] == b[j - 1] else MISMATCH)
        ):
            out_a.append(a[i - 1])
            out_b.append(b[j - 1])
            i, j = i - 1, j - 1
        elif i > 0 and score[i][j] == score[i - 1][j] + GAP:
            out_a.append(a[i - 1])
            out_b.append(GAP_TOKEN)
            i -= 1
        else:
            out_a.append(GAP_TOKEN)
            out_b.append(b[j - 1])
            j -= 1
    out_a.reverse()
    out_b.reverse()
    return out_a, out_b, score[n][m]


def greedy_msa(sequences: Sequence[Sequence[str]]) -> List[List[Optional[str]]]:
    """Greedy progressive MSA: align each sequence to the profile so far.

    The profile is the column-wise majority class of already-aligned
    sequences; aligning a new sequence may insert gap columns into all
    previous rows (standard progressive behaviour).
    """
    if not sequences:
        return []
    aligned: List[List[Optional[str]]] = [list(sequences[0])]
    for seq in sequences[1:]:
        profile = _profile(aligned)
        pa, pb, _ = needleman_wunsch(profile, list(seq))
        # pa is the profile with possible new gap columns: replay the
        # gap insertions into every aligned row
        new_rows: List[List[Optional[str]]] = [[] for _ in aligned]
        col = 0
        for tok in pa:
            if tok is GAP_TOKEN:
                for row in new_rows:
                    row.append(GAP_TOKEN)
            else:
                for row, old in zip(new_rows, aligned):
                    row.append(old[col])
                col += 1
        aligned = new_rows
        aligned.append(pb)
    return aligned


def _profile(aligned: List[List[Optional[str]]]) -> List[str]:
    from collections import Counter

    n_cols = len(aligned[0])
    out = []
    for c in range(n_cols):
        counts = Counter(
            row[c] for row in aligned if row[c] is not GAP_TOKEN
        )
        out.append(counts.most_common(1)[0][0] if counts else "?")
    return out


def gap_free(aligned: List[List[Optional[str]]]) -> bool:
    """True when no row needed a gap (identical class sequences)."""
    return all(GAP_TOKEN not in row for row in aligned)

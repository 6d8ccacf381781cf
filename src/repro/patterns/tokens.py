"""Lexer: split a string value into token runs (paper §2.4, §3).

The paper defines the token count ``t(v)`` as "the number of consecutive
sequences of letters, digits, or symbols in v".  We lex at two levels:

- **level-2 runs** (the paper's tokens): maximal runs of digits (``D``),
  letters (``L``) or symbols (``S`` — anything else, including
  whitespace).  ``t(v)`` counts these.
- **level-1 segments**: maximal *alphanumeric* stretches (one or more
  adjacent ``D``/``L`` runs) alternating with symbol runs.  Level-1
  segments are what the ``<alphanum>`` tokens of the hierarchy
  generalize over; they keep mixed letter/digit data (GUIDs, hex ids)
  alignable even though their level-2 run structure varies per value.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

#: Level-2 run classes.
DIGIT = "D"
LETTER = "L"
SYMBOL = "S"
#: Level-1 segment classes (ALNUM groups adjacent D/L runs).
ALNUM = "A"


@dataclass(frozen=True)
class Run:
    """A maximal run of same-class characters: ``cls`` ∈ {D, L, S}."""

    cls: str
    text: str

    def __len__(self) -> int:  # pragma: no cover - trivial
        return len(self.text)


def _char_class(ch: str) -> str:
    if ch.isdigit():
        return DIGIT
    if ch.isalpha():
        return LETTER
    return SYMBOL


def lex(value: str) -> List[Run]:
    """Split ``value`` into level-2 runs (the paper's tokens)."""
    runs: List[Run] = []
    if not value:
        return runs
    start = 0
    cur = _char_class(value[0])
    for i in range(1, len(value)):
        c = _char_class(value[i])
        if c != cur:
            runs.append(Run(cur, value[start:i]))
            start, cur = i, c
    runs.append(Run(cur, value[start:]))
    return runs


def token_count(value: str) -> int:
    """The paper's ``t(v)``: number of level-2 runs."""
    return len(lex(value))


@dataclass(frozen=True)
class Segment:
    """A level-1 segment: either one symbol run, or ≥1 adjacent D/L runs.

    ``cls`` is ``A`` (alphanumeric) or ``S`` (symbols); ``runs`` holds
    the underlying level-2 runs (a single run for symbol segments).
    """

    cls: str
    runs: tuple

    @property
    def text(self) -> str:
        return "".join(r.text for r in self.runs)


def segments(value: str) -> List[Segment]:
    """Group level-2 runs into level-1 segments (alnum vs symbol)."""
    segs: List[Segment] = []
    pending: List[Run] = []
    for run in lex(value):
        if run.cls == SYMBOL:
            if pending:
                segs.append(Segment(ALNUM, tuple(pending)))
                pending = []
            segs.append(Segment(SYMBOL, (run,)))
        else:
            pending.append(run)
    if pending:
        segs.append(Segment(ALNUM, tuple(pending)))
    return segs


def skeleton(value: str) -> tuple:
    """Level-1 shape of a value: tuple of segment classes ('A'/'S').

    Two values with the same skeleton are alignable segment-by-segment;
    the basic FMDV (homogeneity assumption, §2.1) requires a single
    skeleton across the whole column.
    """
    return tuple(s.cls for s in segments(value))

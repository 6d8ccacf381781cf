"""Pattern-language substrate for Auto-Validate.

The paper (§2.1) validates string columns with regex-like patterns drawn
from a generalization hierarchy.  This package provides:

- :mod:`repro.patterns.tokens` — the lexer (value → token runs),
- :mod:`repro.patterns.pattern` — the ``Token``/``Pattern`` types with a
  canonical string form (used as index keys) and regex compilation,
- :mod:`repro.patterns.generate` — Algorithm 1 (coarse→fine pattern
  generation), the hypothesis space ``H(C)`` and the per-column
  candidate set ``P(D)`` with local impurity scores.
"""
from repro.patterns.pattern import Pattern, Token, parse_pattern
from repro.patterns.tokens import Run, lex, segments, token_count

__all__ = [
    "Pattern",
    "Token",
    "parse_pattern",
    "Run",
    "lex",
    "segments",
    "token_count",
]

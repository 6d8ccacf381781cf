"""Dictionary-based validators: TFDV, Deequ-Cat, Deequ-Fra (§5.2).

Google TFDV and Amazon Deequ's CategoricalRangeRule suggest a fixed
dictionary of observed training values and require future values to
come from it; Deequ's FractionalCategoricalRangeRule tolerates a
fraction outside (we use its default 0.9 threshold).  These are the
paper's motivating false-positive factories on open-domain string
columns (dates, ids) while being fine on closed enums.
"""
from __future__ import annotations

from typing import Optional, Sequence

from repro.baselines.base import DictRule

DEEQU_FRA_THRESHOLD = 0.9


def fit_tfdv(train_values: Sequence[str], ctx=None) -> Optional[DictRule]:
    """TFDV infers a value domain for string features unconditionally —
    the source of its >90% false-alarm rate on open-domain columns."""
    vals = [v for v in train_values if v is not None]
    if not vals:
        return None
    return DictRule(frozenset(vals), min_frac=1.0)


def _categorical(vals: Sequence[str]) -> bool:
    """Deequ's constraint-suggestion precondition: the column must look
    categorical (low distinct-to-total ratio) before a
    (Fractional)CategoricalRangeRule is suggested at all."""
    return len(set(vals)) <= max(5, 0.6 * len(vals))


def fit_deequ_cat(train_values: Sequence[str], ctx=None) -> Optional[DictRule]:
    vals = [v for v in train_values if v is not None]
    if not vals or not _categorical(vals):
        return None
    return DictRule(frozenset(vals), min_frac=1.0)


def fit_deequ_fra(train_values: Sequence[str], ctx=None) -> Optional[DictRule]:
    vals = [v for v in train_values if v is not None]
    if not vals or not _categorical(vals):
        return None
    return DictRule(frozenset(vals), min_frac=DEEQU_FRA_THRESHOLD)

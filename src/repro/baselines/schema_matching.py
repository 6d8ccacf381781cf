"""Schema-matching baselines SM-I-1, SM-I-10, SM-P-M, SM-P-P (§5.2).

These "broaden" the training sample with related corpus columns before
profiling:

- **SM-I-k**: any corpus column sharing more than k distinct instances
  with the training values joins the training pool;
- **SM-P-M / SM-P-P**: corpus columns whose majority / plurality coarse
  pattern (level-1 skeleton) equals the training column's join the pool.

The pooled values are then profiled with Potter's Wheel (the paper
invokes PWheel on the result as the best-performing profiler).
"""
from __future__ import annotations

from collections import Counter, defaultdict
from typing import Dict, List, Optional, Sequence, Set, Tuple

from repro.baselines import pwheel
from repro.patterns.tokens import skeleton

#: cap on pooled values so profiling stays bounded
_POOL_CAP = 4000


class SchemaMatchContext:
    """Pre-computed corpus views shared by all SM variants.

    Built once from the corpus columns (list of value-lists): an
    inverted value→column-ids index and per-column skeleton statistics.
    """

    def __init__(self, columns: Sequence[Sequence[str]]):
        self.columns = [list(c) for c in columns]
        self.value_to_cols: Dict[str, Set[int]] = defaultdict(set)
        self.majority_skeleton: List[Optional[tuple]] = []
        self.plurality_skeleton: List[Optional[tuple]] = []
        for i, col in enumerate(self.columns):
            for v in set(col):
                self.value_to_cols[v].add(i)
            counts = Counter(skeleton(v) for v in col)
            if not counts:
                self.majority_skeleton.append(None)
                self.plurality_skeleton.append(None)
                continue
            top, top_n = counts.most_common(1)[0]
            self.plurality_skeleton.append(top)
            self.majority_skeleton.append(
                top if top_n * 2 > len(col) else None
            )


def _pooled_fit(train: Sequence[str], extra_cols: List[int],
                ctx: SchemaMatchContext):
    pool = list(train)
    for i in extra_cols:
        pool.extend(ctx.columns[i])
        if len(pool) >= _POOL_CAP:
            break
    return pwheel.fit(pool[:_POOL_CAP])


def fit_instance(train: Sequence[str], ctx: SchemaMatchContext, k: int):
    """SM-I-k: pool columns overlapping > k distinct training instances."""
    vals = [v for v in train if v]
    if not vals:
        return None
    overlap: Counter = Counter()
    for v in set(vals):
        for i in ctx.value_to_cols.get(v, ()):
            overlap[i] += 1
    matched = [i for i, n in overlap.items() if n >= k]
    return _pooled_fit(vals, matched, ctx)


def fit_pattern(train: Sequence[str], ctx: SchemaMatchContext,
                mode: str = "majority"):
    """SM-P-M / SM-P-P: pool columns with matching coarse pattern."""
    vals = [v for v in train if v]
    if not vals:
        return None
    counts = Counter(skeleton(v) for v in vals)
    top, top_n = counts.most_common(1)[0]
    if mode == "majority":
        if top_n * 2 <= len(vals):
            return pwheel.fit(vals)
        pool_skels = ctx.majority_skeleton
    else:
        pool_skels = ctx.plurality_skeleton
    matched = [i for i, s in enumerate(pool_skels) if s == top]
    return _pooled_fit(vals, matched, ctx)

"""Pattern generation (paper Algorithm 1 + §2.1/§2.4).

Two entry points:

- :func:`hypothesis_patterns` — the online ``H(C)``: all patterns
  consistent with *every* value of a query column (empty when the
  column is not homogeneous at the skeleton level, which is what
  horizontal cuts later relax).
- :func:`column_candidates` — the offline ``P(D)`` for a data column
  ``D ∈ T``: patterns consistent with at least one *skeleton group* of
  values (coarse patterns with sufficient coverage, per Algorithm 1),
  paired with their local impurity ``Imp_D(p)`` (Definition 1).

Candidate construction mirrors Algorithm 1: first the *coarse* shape
(one skeleton per group of values), then *drill-down* of each aligned
segment along the hierarchy chains, ordered most-general-first so that
truncation under ``max_patterns`` keeps the safe (general) end of the
space.  Symbol runs that are constant across values are pinned to
constants (delimiters are structural); alphanumeric segments always
offer the full chain — a segment constant in today's data (e.g. the
month "Mar") must still be generalizable (``<letter>{3}``), which is
the crux of validation-vs-profiling.
"""
from __future__ import annotations

import itertools
from collections import Counter, defaultdict
from typing import Dict, Iterable, List, Optional, Sequence, Tuple

from repro.patterns.pattern import Pattern, Token
from repro.patterns.tokens import ALNUM, DIGIT, LETTER, SYMBOL, Segment, lex, segments

#: Default cap on enumerated patterns per column (general-biased prefix).
#: Sized so that a tau=13-token column (the paper's widest indexed case,
#: e.g. "9/12/2019 9:07:45 AM") is enumerated fully; wider cross-products
#: lose only their most-specific (profiling-style) corner.
MAX_PATTERNS = 4096

TokenSeq = Tuple[Token, ...]
#: A ranked option: (token sequence, specificity rank). Rank 0 = most
#: general; ranks order the cross-product so truncation under the cap
#: drops the most-specific (profiling-style) corner first.
RankedOpt = Tuple[TokenSeq, int]


def _run_options(cls: str, texts: Sequence[str]) -> List[RankedOpt]:
    """Hierarchy chain for one aligned level-2 run, general → specific.

    ``<num>`` belongs to the matching language but is not enumerated:
    it is strictly more general than ``<digit>+`` and loses every
    tie-break, so enumerating it would only bloat the cross-product
    (the paper's selected validation patterns never use it either).
    """
    lengths = {len(t) for t in texts}
    same_len = len(lengths) == 1
    distinct = set(texts)
    cls_tok = DIGIT if cls == DIGIT else LETTER
    opts: List[RankedOpt] = [((Token.of(cls_tok),), 0)]
    if same_len:
        opts.append(((Token.of(cls_tok, next(iter(lengths))),), 1))
    if len(distinct) == 1:
        opts.append(((Token.const(next(iter(distinct))),), 2))
    return opts


def _segment_options(cls: str, texts: Sequence[str]) -> Tuple[List[RankedOpt], int]:
    """Candidate token-sequences + effective width for one segment.

    Returns ``(options, width)`` where options is ordered general →
    specific and ``width`` is the number of pattern tokens this segment
    contributes (the τ cap of §2.4 bounds *enumeration size*, so it is
    measured on the pattern structure actually enumerated: 1 for an
    ``<alnum>``-generalized segment — even a 32-hex-char GUID block —
    and the run count when level-2 refinement applies).
    """
    distinct = list(dict.fromkeys(texts))
    lengths = {len(t) for t in distinct}
    same_len = len(lengths) == 1

    if cls == SYMBOL:
        # Delimiters: pin to constant when stable, else generalize.
        if len(distinct) == 1:
            return [((Token.const(distinct[0]),), 0)], 1
        opts: List[RankedOpt] = [((Token.of(SYMBOL),), 0)]
        if same_len:
            opts.append(((Token.of(SYMBOL, next(iter(lengths))),), 1))
        return opts, 1

    # Refined (level-2) candidates when all values share run structure.
    # When refinement is available the segment-level <alnum> options are
    # dropped: the refined chain covers the useful generalizations and
    # keeping both would square the cross-product (the paper's selected
    # patterns never use <alphanum> where letter/digit structure is
    # stable — <alphanum> earns its keep on GUID/hex-style segments
    # whose run structure varies per value).
    run_lists = [lex(t) for t in distinct]
    shapes = {tuple(r.cls for r in runs) for runs in run_lists}
    single_run = shapes == {("D",)} or shapes == {("L",)}
    refined: List[RankedOpt] = []
    if len(shapes) == 1:
        shape = next(iter(shapes))
        per_run: List[List[RankedOpt]] = []
        for idx, rcls in enumerate(shape):
            per_run.append(_run_options(rcls, [runs[idx].text for runs in run_lists]))
        # a refined candidate's rank is the SUM of its per-run ranks,
        # not its position in the flat product — so multi-run segments
        # don't exile moderately-specific combos to the enumeration tail
        for combo in itertools.product(*per_run):
            seq = tuple(tok for part, _ in combo for tok in part)
            refined.append((seq, sum(rank for _, rank in combo)))
    if single_run:
        # Pure digit / pure letter segment: the refined chain IS the
        # hierarchy chain; <alnum> adds nothing but cross-product bloat.
        return refined, 1
    # Mixed letter/digit segment (GUID blocks, hex ids): offer <alnum>
    # generalizations even when the sampled values happen to agree on a
    # run structure — agreement is often spurious at 10%-sample size,
    # and the corpus FPR/coverage test is what should decide.
    opts: List[RankedOpt] = [((Token.of(ALNUM),), 0)]
    if same_len:
        opts.append(((Token.of(ALNUM, next(iter(lengths))),), 1))
    refined = [(seq, rank + 1) for seq, rank in refined]
    width = len(next(iter(shapes))) if len(shapes) == 1 else 1
    return opts + refined, width


def _aligned_segment_texts(values: Sequence[str]) -> Optional[List[Tuple[str, List[str]]]]:
    """Align values segment-wise; None when skeletons differ.

    Returns, per level-1 position, ``(segment_class, texts_per_value)``.
    """
    seg_lists: List[List[Segment]] = [segments(v) for v in values]
    shapes = {tuple(s.cls for s in sl) for sl in seg_lists}
    if len(shapes) != 1:
        return None
    shape = next(iter(shapes))
    out: List[Tuple[str, List[str]]] = []
    for i, cls in enumerate(shape):
        out.append((cls, [sl[i].text for sl in seg_lists]))
    return out


def _ranked_product(lists: List[List[RankedOpt]], limit: int):
    """Yield combinations ordered by total specificity rank.

    Each position offers ranked options (0 = most general); a
    combination's rank is the sum of its options' ranks.  Enumerating
    rank 0, 1, 2 … guarantees that truncation under ``limit`` drops
    only the most-specific corner of the cross-product (a plain
    ``itertools.product`` would instead pin early segments to their
    most general option and starve patterns like
    ``<digit>+/<digit>+/<digit>{4}``).
    """
    sorted_lists = [sorted(l, key=lambda o: o[1]) for l in lists]
    tail_max = [0] * (len(sorted_lists) + 1)
    for i in range(len(sorted_lists) - 1, -1, -1):
        tail_max[i] = tail_max[i + 1] + max(r for _, r in sorted_lists[i])
    max_rank = tail_max[0]
    yielded = 0
    n = len(sorted_lists)

    def rec(pos: int, remaining: int, acc: List[TokenSeq]):
        nonlocal yielded
        if yielded >= limit:
            return
        if pos == n:
            if remaining == 0:
                yielded += 1
                yield tuple(acc)
            return
        for opt, rank in sorted_lists[pos]:
            if rank > remaining or remaining - rank > tail_max[pos + 1]:
                continue
            acc.append(opt)
            yield from rec(pos + 1, remaining - rank, acc)
            acc.pop()
            if yielded >= limit:
                return

    for rank in range(max_rank + 1):
        if yielded >= limit:
            break
        yield from rec(0, rank, [])


def enumerate_consistent(
    values: Sequence[str], *, max_patterns: int = MAX_PATTERNS
) -> List[Pattern]:
    """All patterns (≤ ``max_patterns``) consistent with every value.

    Empty when values do not share a level-1 skeleton or are empty
    strings.  Ordered most-general-first (by total specificity rank).
    """
    vals = [v for v in dict.fromkeys(values)]
    if not vals or any(v == "" for v in vals):
        return []
    aligned = _aligned_segment_texts(vals)
    if aligned is None:
        return []
    per_segment: List[List[TokenSeq]] = []
    for cls, texts in aligned:
        opts, _ = _segment_options(cls, texts)
        per_segment.append(opts)
    out: List[Pattern] = []
    for combo in _ranked_product(per_segment, max_patterns):
        out.append(Pattern.of(tok for part in combo for tok in part))
    return out


def hypothesis_patterns(
    values: Sequence[str], *, max_patterns: int = MAX_PATTERNS
) -> List[Pattern]:
    """The paper's ``H(C)`` = ∩_{v∈C} P(v) \\ {trivial}, for a query column."""
    return enumerate_consistent(values, max_patterns=max_patterns)


def skeleton_groups(values: Sequence[str]) -> Dict[tuple, List[str]]:
    """Group values by level-1 skeleton (coarse pattern of Algorithm 1)."""
    groups: Dict[tuple, List[str]] = defaultdict(list)
    for v in values:
        groups[tuple(s.cls for s in segments(v))].append(v)
    return groups


def column_candidates(
    values: Sequence[str],
    *,
    tau: int = 13,
    min_group_frac: float = 0.1,
    max_patterns: int = MAX_PATTERNS,
) -> List[Tuple[Pattern, float]]:
    """Offline ``P(D)`` with local impurities for one data column.

    Implements Algorithm 1 + §2.4: skeleton groups below the coverage
    threshold are dropped, groups wider than ``tau`` tokens are skipped
    (vertical cuts compensate at query time), and each retained
    pattern ``p`` is paired with ``Imp_D(p)`` computed over *all*
    values of the column (Definition 1).
    """
    counts = Counter(values)
    total = sum(counts.values())
    if total == 0:
        return []
    groups = skeleton_groups(list(counts))
    best: Dict[Pattern, float] = {}
    for skel, distinct_vals in groups.items():
        group_count = sum(counts[v] for v in distinct_vals)
        if group_count / total < min_group_frac:
            continue
        if any(v == "" for v in distinct_vals):
            continue
        aligned = _aligned_segment_texts(distinct_vals)
        if aligned is None:  # pragma: no cover - same-skeleton by construction
            continue
        if sum(_segment_options(cls, ts)[1] for cls, ts in aligned) > tau:
            continue
        other_vals = [v for v in counts if tuple(
            s.cls for s in segments(v)) != skel]
        for p in enumerate_consistent(distinct_vals, max_patterns=max_patterns):
            # Group values match by construction; only test other groups.
            matched = group_count + sum(
                counts[v] for v in other_vals if p.matches(v)
            )
            imp = 1.0 - matched / total
            prev = best.get(p)
            if prev is None or imp < prev:
                best[p] = imp
    return list(best.items())

"""Simulated user study (paper Table 3) — substitution, see DESIGN.md.

The paper had 5 human programmers write validation regexes for 20 test
columns; 2 failed outright, the other 3 averaged 117 s/column with
precision ≈ 0.47.  We cannot recruit humans offline, so three
*programmer policies* of decreasing care reproduce the qualitative
finding (hand-written regexes over-fit the observed sample):

- ``prog_careful``: inspects up to 20 values, writes per-token
  class regexes with observed length ranges (ignoring rare oddballs);
- ``prog_dict``: alternation of the literal values seen;
- ``prog_hasty``: generalizes the first 3 values character-by-character.

Human wall-clock times cannot be simulated and are quoted from the
paper in EXPERIMENTS.md, not measured.
"""
from __future__ import annotations

import re
from collections import Counter
from typing import Optional, Sequence

from repro.baselines import ssis, xsystem
from repro.baselines.base import RegexRule
from repro.patterns.tokens import skeleton


def prog_careful(train: Sequence[str], ctx=None) -> Optional[RegexRule]:
    """Looks at 20 values, profiles the dominant shape only."""
    vals = [v for v in train if v][:20]
    if not vals:
        return None
    top, _ = Counter(skeleton(v) for v in vals).most_common(1)[0]
    majority = [v for v in vals if skeleton(v) == top]
    return ssis.fit(majority)


def prog_dict(train: Sequence[str], ctx=None) -> Optional[RegexRule]:
    """Writes an alternation of the literal examples seen."""
    vals = [v for v in train if v][:20]
    if not vals:
        return None
    return RegexRule(tuple(re.escape(v) for v in dict.fromkeys(vals)))


def prog_hasty(train: Sequence[str], ctx=None) -> Optional[RegexRule]:
    """Generalizes only the first three values, character classes fixed."""
    vals = [v for v in train if v][:3]
    if not vals:
        return None
    return xsystem.fit(vals)


PROGRAMMERS = {
    "Programmer#1 (careful)": prog_careful,
    "Programmer#2 (dictionary)": prog_dict,
    "Programmer#3 (hasty)": prog_hasty,
}

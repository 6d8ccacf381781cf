"""Method registry: every compared algorithm behind one interface.

``METHODS[name](train_values, ctx)`` returns a rule object exposing
``validate_counts({value: count}) -> bool`` (True = pass), or None when
the method cannot produce a rule (treated as "never alarms").
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Dict, List, Optional, Sequence

from repro.baselines import dictionary, flashprofile, grok, pwheel, ssis, xsystem
from repro.baselines.schema_matching import (
    SchemaMatchContext,
    fit_instance,
    fit_pattern,
)
from repro.core.auto_validate import learn_rule
from repro.core.fmdv import FMDVConfig
from repro.core.index import PatternIndex


@dataclass
class EvalContext:
    """Shared state handed to every method's fit function."""

    index: PatternIndex
    corpus_columns: List[List[str]]
    cfg: FMDVConfig = field(default_factory=FMDVConfig)
    _sm: Optional[SchemaMatchContext] = None

    @property
    def sm(self) -> SchemaMatchContext:
        if self._sm is None:
            self._sm = SchemaMatchContext(self.corpus_columns)
        return self._sm


def _fmdv_variant(variant: str):
    def fit(train: Sequence[str], ctx: EvalContext):
        return learn_rule(train, ctx.index, ctx.cfg, variant)

    return fit


METHODS: Dict[str, Callable] = {
    "FMDV": _fmdv_variant("fmdv"),
    "FMDV-V": _fmdv_variant("fmdv-v"),
    "FMDV-H": _fmdv_variant("fmdv-h"),
    "FMDV-VH": _fmdv_variant("fmdv-vh"),
    "TFDV": lambda t, ctx: dictionary.fit_tfdv(t),
    "Deequ-Cat": lambda t, ctx: dictionary.fit_deequ_cat(t),
    "Deequ-Fra": lambda t, ctx: dictionary.fit_deequ_fra(t),
    "PWheel": lambda t, ctx: pwheel.fit(t),
    "SSIS": lambda t, ctx: ssis.fit(t),
    "XSystem": lambda t, ctx: xsystem.fit(t),
    "FlashProfile": lambda t, ctx: flashprofile.fit(t),
    "Grok": lambda t, ctx: grok.fit(t),
    "SM-I-1": lambda t, ctx: fit_instance(t, ctx.sm, 1),
    "SM-I-10": lambda t, ctx: fit_instance(t, ctx.sm, 10),
    "SM-P-M": lambda t, ctx: fit_pattern(t, ctx.sm, "majority"),
    "SM-P-P": lambda t, ctx: fit_pattern(t, ctx.sm, "plurality"),
}

#: the order Figure 10 presents
METHOD_ORDER = list(METHODS)

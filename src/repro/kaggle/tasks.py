"""Synthetic stand-ins for the paper's 11 Kaggle tasks (Figure 15).

The real Kaggle datasets are unavailable offline, so each task is a
synthetic supervised dataset named after its paper counterpart, with
the one property the case study needs: **≥2 string-valued categorical
attributes whose content carries predictive signal**, so that swapping
two of them (simulated schema-drift, §5.3) degrades model quality.

Which swaps are detectable by pattern-validation is a design axis: the
paper found 8/11 tasks detectable, failing on WestNile, HomeDepot and
WalmartTrips.  We mirror that by giving exactly those three tasks swap
pairs drawn from *pattern-identical* domains (two letter-only enums,
or two columns of the same date format) — a swap no syntactic
validator can see.
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass
from typing import List, Tuple

import numpy as np
import pandas as pd

from repro.lake.domains import domain_by_name


@dataclass(frozen=True)
class KaggleTask:
    """Configuration of one synthetic task."""

    name: str
    kind: str  # 'classification' | 'regression'
    cat_domains: Tuple[str, ...]
    swap: Tuple[int, int]        # categorical column indices swapped in test
    detectable: bool             # design intent (pattern-distinct swap?)
    n_train: int = 2000
    n_test: int = 800


#: the paper's 7 classification + 4 regression tasks
TASKS: List[KaggleTask] = [
    KaggleTask("Titanic", "classification",
               ("booking_status", "date_slash", "locale"), (0, 1), True),
    KaggleTask("AirBnb", "classification",
               ("nl_city", "date_iso", "ads_status"), (1, 2), True),
    KaggleTask("BNPParibas", "classification",
               ("token12", "log_level", "int_id8"), (0, 1), True),
    KaggleTask("RedHat", "classification",
               ("ticket", "weekday", "guid"), (0, 2), True),
    KaggleTask("SFCrime", "classification",
               ("weekday", "time_hms", "zip5"), (0, 1), True),
    # WestNile: two letter-only enums — pattern-identical swap
    KaggleTask("WestNile", "classification",
               ("ads_status", "booking_status", "date_slash"), (0, 1), False),
    # WalmartTrips: two same-format date columns — pattern-identical swap
    KaggleTask("WalmartTrips", "classification",
               ("date_slash", "date_slash", "weekday"), (0, 1), False),
    KaggleTask("HousePrice", "regression",
               ("zip5", "country", "yyyymm"), (0, 1), True),
    # HomeDepot: two letter-only enums — pattern-identical swap
    KaggleTask("HomeDepot", "regression",
               ("color", "country", "int_seq"), (0, 1), False),
    KaggleTask("Caterpillar", "regression",
               ("code_dash", "date_iso", "bool_str"), (0, 1), True),
    KaggleTask("WalmartSales", "regression",
               ("week_iso", "ads_status", "zip5"), (1, 2), True),
]


def _value_signal(value: str, salt: str) -> float:
    """Stable per-value signal in [-1, 1] (what the GBT must learn)."""
    h = hashlib.md5((salt + value).encode()).digest()
    return (h[0] / 255.0) * 2.0 - 1.0


def generate_task(task: KaggleTask, seed: int = 0) -> Tuple[pd.DataFrame, pd.DataFrame]:
    """Build (train, test) pandas frames: cat_0..k, num_0, num_1, label."""
    rng = np.random.default_rng(seed)
    n = task.n_train + task.n_test
    frame = {}
    signal = np.zeros(n)
    for i, dom_name in enumerate(task.cat_domains):
        dom = domain_by_name(dom_name)
        # low-cardinality pools so train and test share values and the
        # model can actually learn per-value effects
        pool = dom.gen(rng, 40)
        idx = rng.integers(0, len(pool), n)
        col = [pool[j] for j in idx]
        frame[f"cat_{i}"] = col
        weight = 1.0 / (i + 1)
        signal += weight * np.array(
            [_value_signal(v, f"{task.name}:{i}") for v in col]
        )
    frame["num_0"] = rng.normal(0, 1, n)
    frame["num_1"] = rng.normal(0, 1, n)
    signal += 0.4 * frame["num_0"] - 0.2 * frame["num_1"]
    noise = rng.normal(0, 0.3, n)
    if task.kind == "classification":
        frame["label"] = (signal + noise > 0).astype(float)
    else:
        frame["label"] = signal + noise
    pdf = pd.DataFrame(frame)
    return pdf.iloc[: task.n_train].copy(), pdf.iloc[task.n_train :].copy()


def apply_schema_drift(test: pd.DataFrame, task: KaggleTask) -> pd.DataFrame:
    """Swap the positions of the two drifting categorical attributes."""
    a, b = (f"cat_{task.swap[0]}", f"cat_{task.swap[1]}")
    drifted = test.copy()
    drifted[a], drifted[b] = test[b].values, test[a].values
    return drifted

"""Benchmark fixtures: full-scale corpora, indexes and benchmarks built
once per session and shared by every table/figure harness.

Each harness writes its result table to ``results/<name>.txt`` (so the
numbers survive pytest's output capture) and registers headline values
in ``benchmark.extra_info``.
"""
import os

import pytest

from repro.experiments import N_CASES_G, prepare
from repro.lake.corpus import GOVERNMENT

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "results")


@pytest.fixture(scope="session")
def results_dir():
    os.makedirs(RESULTS_DIR, exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def prep_enterprise(spark):
    """Enterprise-lite corpus + offline index + 150-case benchmark."""
    return prepare(spark)


@pytest.fixture(scope="session")
def prep_government(spark):
    """Government-lite corpus + offline index + 120-case benchmark."""
    return prepare(spark, GOVERNMENT, n_cases=N_CASES_G)


def save_table(results_dir: str, name: str, text: str) -> None:
    path = os.path.join(results_dir, f"{name}.txt")
    with open(path, "w") as f:
        f.write(text + "\n")

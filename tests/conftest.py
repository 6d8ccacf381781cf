"""Shared fixtures for the test suite.

``tiny_corpus`` / ``tiny_index`` are a small but fully-featured lake
(all imperfection kinds present) built once per session, driver-side,
so solver tests do not pay Spark job latency.  Spark-marked tests get
the session ``spark`` fixture from the root conftest.
"""
import pytest

from repro.core.index import build_index_local
from repro.lake.corpus import ENTERPRISE, generate_columns, scaled


@pytest.fixture(scope="session")
def tiny_corpus_columns():
    """~70 files / ~450 columns of the enterprise-lite lake."""
    return generate_columns(scaled(ENTERPRISE, 0.14))


@pytest.fixture(scope="session")
def tiny_index(tiny_corpus_columns):
    """Offline index over the tiny corpus (local reference builder)."""
    return build_index_local([c.values for c in tiny_corpus_columns], tau=13)

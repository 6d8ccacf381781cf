"""Synthetic data-lake substrate.

The paper's corpora (a Microsoft enterprise data lake and a UK
government crawl) are proprietary / unavailable offline, so this
package generates a synthetic lake with the structural properties the
algorithms exploit: homogeneous machine-generated columns drawn from a
library of shared *domains*, composite columns concatenated from atomic
domains, ad-hoc special values, impure columns, and natural-language
columns (see DESIGN.md §2 for the substitution argument).
"""
from repro.lake.domains import ALL_DOMAINS, Domain, domain_by_name
from repro.lake.corpus import CorpusSpec, build_corpus, corpus_stats

__all__ = [
    "ALL_DOMAINS",
    "Domain",
    "domain_by_name",
    "CorpusSpec",
    "build_corpus",
    "corpus_stats",
]

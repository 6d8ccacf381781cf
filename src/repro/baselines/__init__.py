"""Reimplementations of the paper's comparison methods (§5.2).

Each baseline exposes ``fit(train_values, ctx) -> rule | None`` where a
rule validates future columns via ``validate(values)`` /
``validate_counts(counts)``.  See DESIGN.md §2 for the substitution
argument per baseline.
"""

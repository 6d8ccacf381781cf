"""Benchmark construction and precision/recall evaluation (paper §5.1)."""

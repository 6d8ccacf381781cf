"""Kaggle schema-drift case study (paper Figure 15) on synthetic tasks."""

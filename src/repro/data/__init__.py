"""Normalized-schema data generators (synthetic + simulated real datasets)."""

"""Benchmark harness reproducing the paper's evaluation tables."""

"""Benchmark-local fixtures: session warmup + cached prepared relations.

The warmup runs every pipeline (join, Parquet write/read, mapInPandas,
broadcast) once before any measurement, so first-use JVM/Arrow costs are not
attributed to whichever algorithm happens to run first (see DESIGN.md).
"""
import pytest

from repro.bench.harness import warmup


@pytest.fixture(scope="session", autouse=True)
def _warm(spark):
    warmup(spark)

"""Shared bench-scale harness: datasets and trained matchers are cached
for the whole benchmark session so each table times only its own
assembly on top of one training pass per (dataset, matcher)."""
import pytest

from repro.harness import Harness


@pytest.fixture(scope="session")
def bench_harness(spark):
    h = Harness(spark, scale="bench")
    yield h
    h.unpersist()


@pytest.fixture(scope="session")
def emit_result():
    """Persist a benchmark's table under results/ (same files as jobs/)."""
    import os
    import sys

    sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))
    from _common import emit

    return emit

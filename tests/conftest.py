"""Shared fixtures for the test suite.

The expensive fixtures are session-scoped: one small Moby dataset and one
full pipeline run at SF=0.05 serve every integration test. Unit tests
build their own tiny inputs.
"""
from __future__ import annotations

import pytest


@pytest.fixture(scope="session")
def moby_small(spark):
    """A small generated Moby dataset (SF=0.05): ~3.1k rentals, ~710
    locations, 92 stations, 54 hotspots."""
    from repro.moby.generator import generate, paper_config

    return generate(spark, paper_config(sf=0.05))


@pytest.fixture(scope="session")
def cleaned_small(spark, moby_small):
    from repro.moby.cleaning import clean

    return clean(moby_small.locations, moby_small.rentals)


@pytest.fixture(scope="session")
def pipeline_small(spark, moby_small):
    """One full pipeline run (HAC + selection + Louvain at all three
    granularities) on the small dataset; integration tests assert
    invariants against it."""
    from repro.pipeline import run_pipeline

    return run_pipeline(spark, data=moby_small)

"""Test fixtures: cached small-scale dataset triangle tables."""
from __future__ import annotations

import pytest

from repro.experiments.common import get_tables
from tests.helpers import SMALL_SCALE


@pytest.fixture(scope="session")
def tables_for(spark):
    """Factory fixture: memoized TriangleTables for a dataset at the
    small test scale (shared across all test modules)."""

    def _get(name: str, scale: float = SMALL_SCALE):
        return get_tables(spark, name, scale=scale, seed=7)

    return _get

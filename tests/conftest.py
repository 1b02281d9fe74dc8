"""Shared test fixtures: one SF=0.01 lake + one Humboldt instance per session.

The root conftest owns the SparkSession; this one adds the (expensive)
lake/catalog/framework builds so the several hundred tests share them.
Tests that mutate state (spec edits, config changes) build their own spec
objects — the shared ``humboldt`` fixture's spec must stay pristine.
"""
from __future__ import annotations

import pytest

from repro.catalog.builder import build_catalog
from repro.core.framework import Humboldt
from repro.lake.writer import write_lake

TEST_SF = 0.01
TEST_SEED = 0


@pytest.fixture(scope="session")
def lake(spark, tmp_path_factory):
    """(lake_root, corpus) at SF=0.01, written once per session."""
    root = str(tmp_path_factory.mktemp("lake"))
    corpus = write_lake(spark, root, sf=TEST_SF, seed=TEST_SEED)
    return root, corpus


@pytest.fixture(scope="session")
def lake_root(lake):
    return lake[0]


@pytest.fixture(scope="session")
def corpus(lake):
    return lake[1]


@pytest.fixture(scope="session")
def catalog(spark, lake_root):
    """Catalog with column profiles (shared, read-only)."""
    return build_catalog(spark, lake_root, with_profiles=True)


@pytest.fixture(scope="session")
def humboldt(spark, lake_root, catalog):
    """Framework facade over the shared catalog (default spec).

    Session-scoped: tests must not mutate its spec/config. Use the
    ``fresh_humboldt`` factory for mutation tests.
    """
    return Humboldt(spark, lake_root, catalog=catalog)


@pytest.fixture()
def fresh_humboldt(spark, lake_root, catalog):
    """A new facade (own spec/config instances) sharing the cached catalog."""

    def make(spec=None):
        return Humboldt(spark, lake_root, spec=spec, catalog=catalog)

    return make

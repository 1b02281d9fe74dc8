"""Benchmark fixtures: SF=0.1 lake (~100 MB inputs) shared per session.

Override the scale with ``BENCH_SF`` (e.g. BENCH_SF=0.01 for a quick pass).
"""
from __future__ import annotations

import os

import pytest

from repro.catalog.builder import build_catalog
from repro.core.framework import Humboldt
from repro.lake.writer import write_lake

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))
BENCH_SEED = 0


@pytest.fixture(scope="session")
def bench_lake(spark, tmp_path_factory):
    root = str(tmp_path_factory.mktemp("bench_lake"))
    corpus = write_lake(spark, root, sf=BENCH_SF, seed=BENCH_SEED)
    return root, corpus


@pytest.fixture(scope="session")
def bench_root(bench_lake):
    return bench_lake[0]


@pytest.fixture(scope="session")
def bench_corpus(bench_lake):
    return bench_lake[1]


@pytest.fixture(scope="session")
def bench_catalog(spark, bench_root):
    return build_catalog(spark, bench_root, with_profiles=True)


@pytest.fixture(scope="session")
def bench_humboldt(spark, bench_root, bench_catalog):
    return Humboldt(spark, bench_root, catalog=bench_catalog)

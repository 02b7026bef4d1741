"""Shared session fixtures for the benchmark suite.

One dataset/workload setup at ``REPRO_BENCH_SF`` (default 0.1, ~1.2M
rides — the paper uses 12M) is built once and shared; every benchmark
then measures only engine execution, mirroring
:mod:`repro.experiments`'s methodology.
"""
import os

import pytest

from repro.baselines.binary_search import BinarySearchEngine
from repro.baselines.btree import BTreeEngine
from repro.baselines.quadtree import QuadtreeEngine
from repro.baselines.rtree import RTreeEngine
from repro.core.geoblock import AdaptiveGeoBlock, GeoBlock
from repro.experiments import DEFAULT_LEVEL, _train_v2, make_setup

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="session")
def setup():
    s = make_setup(BENCH_SF)
    s.cover_all(DEFAULT_LEVEL)
    return s


@pytest.fixture(scope="session")
def block_v1(setup):
    return GeoBlock.build_from_raw(setup.raw, level=DEFAULT_LEVEL)


@pytest.fixture(scope="session")
def block_v2(setup, block_v1):
    """V2 trained per the paper's Fig. 9 protocol: base once + skewed x4,
    5% aggregate threshold."""
    plans = setup.cover_all(DEFAULT_LEVEL)
    skew_plans = [plans[i] for i in setup.skew_indices()]
    v2 = AdaptiveGeoBlock.from_block(block_v1)
    _train_v2(v2, plans, skew_plans, skew_reps=4, threshold=0.05)
    return v2


@pytest.fixture(scope="session")
def engines(setup, block_v1, block_v2):
    return {
        "BinarySearch": BinarySearchEngine(setup.raw, DEFAULT_LEVEL),
        "BTree": BTreeEngine(setup.raw, DEFAULT_LEVEL),
        "PHTree": QuadtreeEngine(setup.raw),
        "RTree": RTreeEngine(setup.raw),
        "BlocksV1": block_v1,
        "BlocksV2": block_v2,
    }

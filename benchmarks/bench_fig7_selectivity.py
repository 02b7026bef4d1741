"""Figure 7 — single-query runtime at varying selectivity for all six
engines (cell engines share the covering plan; PHTree/RTree use the
interior rectangle, as in the paper)."""
import pytest

from repro.experiments import DEFAULT_LEVEL
from repro.s2lite.covering import exterior_covering
from repro.workloads import DEFAULT_AGGS, selectivity_suite

FRACTIONS = (0.001, 0.01, 0.1)
CELL_ENGINES = ["BinarySearch", "BTree", "BlocksV1", "BlocksV2"]


@pytest.fixture(scope="module")
def sel_plans(setup):
    suite = selectivity_suite(setup.taxi, FRACTIONS)
    return {
        f: {
            "cells": exterior_covering(p, DEFAULT_LEVEL),
            "rect": p.interior_rect(),
        }
        for f, p in suite.items()
    }


@pytest.mark.parametrize("frac", FRACTIONS)
@pytest.mark.parametrize("engine_name", CELL_ENGINES)
def test_cell_engine_query(benchmark, engines, sel_plans, engine_name, frac):
    eng = engines[engine_name]
    cells = sel_plans[frac]["cells"]
    benchmark.pedantic(
        lambda: eng.query_cells(cells, DEFAULT_AGGS), rounds=5, iterations=1
    )


@pytest.mark.parametrize("frac", FRACTIONS)
def test_phtree_query(benchmark, engines, sel_plans, frac):
    rect = sel_plans[frac]["rect"]
    benchmark.pedantic(
        lambda: engines["PHTree"].query_rect(rect, DEFAULT_AGGS),
        rounds=5,
        iterations=1,
    )


@pytest.mark.parametrize("frac", FRACTIONS)
def test_rtree_count(benchmark, engines, sel_plans, frac):
    rect = sel_plans[frac]["rect"]
    benchmark.pedantic(
        lambda: engines["RTree"].count_rect(rect), rounds=5, iterations=1
    )

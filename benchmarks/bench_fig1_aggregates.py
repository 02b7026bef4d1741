"""Figure 1 — combined-workload runtime (base + 4x skewed) vs number of
queried aggregates, for BinarySearch, BTree, Blocks V1 and Blocks V2."""
import pytest

from repro.experiments import DEFAULT_LEVEL, EXTENDED_AGGS

ENGINES = ["BinarySearch", "BTree", "BlocksV1", "BlocksV2"]


@pytest.fixture(scope="module")
def combined_plans(setup):
    plans = setup.cover_all(DEFAULT_LEVEL)
    skew_plans = [plans[i] for i in setup.skew_indices()]
    return list(plans) + [p for _ in range(4) for p in skew_plans]


@pytest.mark.parametrize("n_aggs", [1, 8])
@pytest.mark.parametrize("engine_name", ENGINES)
def test_workload_runtime(benchmark, engines, combined_plans, engine_name, n_aggs):
    eng = engines[engine_name]
    specs = EXTENDED_AGGS[:n_aggs]
    benchmark.pedantic(
        lambda: [eng.query_cells(cells, specs) for cells in combined_plans],
        rounds=3,
        iterations=1,
    )

"""Figure 9 — skewed-part runtime for V1 vs adapted V2 (the adaptive
cache pays off on the repeated 10% of neighborhoods)."""
import pytest

from repro.experiments import DEFAULT_LEVEL
from repro.workloads import DEFAULT_AGGS

REPS = 8


@pytest.fixture(scope="module")
def skew_plans(setup):
    plans = setup.cover_all(DEFAULT_LEVEL)
    return [plans[i] for i in setup.skew_indices()] * REPS


# batch=False: the adaptive experiments run query-at-a-time, the paper's
# per-cell cost structure where the V1/V2 difference lives (EXPERIMENTS.md).


@pytest.mark.parametrize("engine_name", ["BlocksV1", "BlocksV2"])
def test_skew_part(benchmark, engines, skew_plans, engine_name):
    eng = engines[engine_name]
    benchmark.pedantic(
        lambda: [
            eng.query_cells(cells, DEFAULT_AGGS, batch=False) for cells in skew_plans
        ],
        rounds=3,
        iterations=1,
    )


@pytest.mark.parametrize("engine_name", ["BlocksV1", "BlocksV2"])
def test_base_part(benchmark, engines, setup, engine_name):
    eng = engines[engine_name]
    plans = setup.cover_all(DEFAULT_LEVEL)
    benchmark.pedantic(
        lambda: [eng.query_cells(cells, DEFAULT_AGGS, batch=False) for cells in plans],
        rounds=3,
        iterations=1,
    )

"""Figure 10 — workload runtime of V2 at different AggregateTrie size
thresholds (V1 runtime is the flat reference, benched in bench_fig9)."""
import pytest

from repro.core.geoblock import AdaptiveGeoBlock
from repro.experiments import DEFAULT_LEVEL, _train_v2
from repro.workloads import DEFAULT_AGGS


@pytest.mark.parametrize("threshold", [0.01, 0.05, 0.5])
def test_combined_workload_at_threshold(benchmark, setup, block_v1, threshold):
    plans = setup.cover_all(DEFAULT_LEVEL)
    skew_plans = [plans[i] for i in setup.skew_indices()]
    v2 = AdaptiveGeoBlock.from_block(block_v1)
    _train_v2(v2, plans, skew_plans, skew_reps=4, threshold=threshold)
    combined = list(plans) + skew_plans * 4
    # batch=False: per-cell mode, as in the other adaptive experiments.
    benchmark.pedantic(
        lambda: [v2.query_cells(cells, DEFAULT_AGGS, batch=False) for cells in combined],
        rounds=3,
        iterations=1,
    )

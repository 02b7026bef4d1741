"""Figure 8 — base-workload runtime vs block level (the error half of
the figure is deterministic, measured by jobs/fig8_level_error.py)."""
import pytest

from repro.core.geoblock import GeoBlock
from repro.workloads import DEFAULT_AGGS


@pytest.mark.parametrize("level", [13, 15, 17, 19, 21])
def test_base_workload_at_level(benchmark, setup, level):
    blk = GeoBlock.build_from_raw(setup.raw, level=level)
    plans = setup.cover_all(level)
    benchmark.pedantic(
        lambda: [blk.query_cells(cells, DEFAULT_AGGS) for cells in plans],
        rounds=3,
        iterations=1,
    )

"""Table 1 — GeoBlock build time split into sorting and building, at
block levels 13..21.

One benchmark row per table row: ``sort`` measures the paper's
"Sorting" column (key extraction + reorder of all columns), the
``build[L]`` rows measure the "Building" column per level.
"""
import pytest

from repro.core.geoblock import GeoBlock
from repro.core.raw import extract_and_reorganize
from repro.workloads import VALUE_COLS


def test_sorting_phase(benchmark, setup):
    benchmark.pedantic(
        lambda: extract_and_reorganize(setup.taxi, VALUE_COLS),
        rounds=2,
        iterations=1,
    )


@pytest.mark.parametrize("level", range(13, 22))
def test_building_phase(benchmark, setup, level):
    benchmark.pedantic(
        lambda: GeoBlock.build_from_raw(setup.raw, level=level),
        rounds=3,
        iterations=1,
    )

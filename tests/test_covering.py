"""Tests for exterior/interior polygon coverings.

The covering is GeoBlocks' only lossy step; these tests pin down the
paper's invariants: exterior coverings are supersets (false positives
only), interior coverings are subsets, levels respect the configured
bounds, and finer max levels shrink the spatial slack.
"""
import numpy as np
import pytest

from repro.s2lite.cell import cell_bounds, cell_level, range_max, range_min
from repro.s2lite.covering import exterior_covering, interior_covering, quad_rect
from repro.s2lite.polygon import Polygon

# A quadrilateral roughly the size of a NYC neighbourhood, in Manhattan.
HOOD = Polygon(
    [(-73.99, 40.74), (-73.97, 40.745), (-73.965, 40.76), (-73.985, 40.765)]
)


def _sample_points(poly, n, seed=0):
    g = np.random.default_rng(seed)
    b = poly.bbox
    lons = g.uniform(b.lon_lo, b.lon_hi, n * 4)
    lats = g.uniform(b.lat_lo, b.lat_hi, n * 4)
    inside = poly.contains_points(lons, lats)
    return lons[inside][:n], lats[inside][:n]


def _key_in_cells(keys, cells):
    cells = np.asarray(sorted(cells), dtype=np.int64)
    lo = range_min(cells)
    hi = range_max(cells)
    idx = np.searchsorted(lo, keys, side="right") - 1
    idx = np.clip(idx, 0, len(cells) - 1)
    return (keys >= lo[idx]) & (keys <= hi[idx])


@pytest.mark.parametrize("max_level", [13, 15, 17])
def test_exterior_covering_is_superset(max_level):
    from repro.s2lite.cell import point_keys_from_latlon

    cells = exterior_covering(HOOD, max_level)
    assert cells, "covering must be non-empty"
    lons, lats = _sample_points(HOOD, 300)
    keys = point_keys_from_latlon(lats, lons)
    assert _key_in_cells(keys, cells).all()


@pytest.mark.parametrize("max_level", [15, 17])
def test_interior_covering_is_subset(max_level):
    cells = interior_covering(HOOD, max_level)
    for cid in cells:
        lon_lo, lat_lo, lon_hi, lat_hi = cell_bounds(cid)
        # Cell corners and center must be inside the polygon.
        for lon, lat in [
            (lon_lo, lat_lo),
            (lon_hi, lat_hi),
            ((lon_lo + lon_hi) / 2, (lat_lo + lat_hi) / 2),
        ]:
            assert HOOD.contains_point(lon, lat)


def test_interior_subset_of_exterior():
    ext = set(exterior_covering(HOOD, 16))
    for cid in interior_covering(HOOD, 16):
        # Every interior cell (or an ancestor of it) appears in the
        # exterior covering.
        lvl = cell_level(cid)
        from repro.s2lite.cell import parent

        assert any(parent(cid, a) in ext for a in range(lvl + 1)) or cid in ext


@pytest.mark.parametrize("max_level", [13, 15, 17])
def test_level_bounds_respected(max_level):
    min_level = 11
    cells = exterior_covering(HOOD, max_level, min_level=min_level)
    levels = [cell_level(c) for c in cells]
    assert max(levels) <= max_level
    assert min(levels) >= min_level


def test_covering_sorted_and_disjoint():
    cells = exterior_covering(HOOD, 16)
    assert cells == sorted(cells)
    spans = [(range_min(c), range_max(c)) for c in cells]
    for (a_lo, a_hi), (b_lo, b_hi) in zip(spans, spans[1:]):
        assert b_lo > a_hi, "covering cells must not overlap"


def test_finer_covering_smaller_area():
    def area(cells):
        total = 0.0
        for c in cells:
            lon_lo, lat_lo, lon_hi, lat_hi = cell_bounds(c)
            total += (lon_hi - lon_lo) * (lat_hi - lat_lo)
        return total

    coarse = area(exterior_covering(HOOD, 13))
    fine = area(exterior_covering(HOOD, 17))
    assert fine < coarse
    assert fine >= HOOD.area() * 0.999  # exterior covering majorizes area


def test_interior_area_below_polygon_area():
    def area(cells):
        total = 0.0
        for c in cells:
            lon_lo, lat_lo, lon_hi, lat_hi = cell_bounds(c)
            total += (lon_hi - lon_lo) * (lat_hi - lat_lo)
        return total

    assert area(interior_covering(HOOD, 17)) <= HOOD.area() * 1.001


def test_covering_deterministic():
    assert exterior_covering(HOOD, 16) == exterior_covering(HOOD, 16)


def test_covering_uses_coarse_cells_inside():
    """A polygon much larger than max-level cells must be covered using
    some cells coarser than max_level (perimeter-proportional covering)."""
    cells = exterior_covering(HOOD, 18)
    levels = [cell_level(c) for c in cells]
    assert min(levels) < 18
    assert max(levels) == 18


def test_quad_rect_tiles_parent():
    r = quad_rect(3, 5, 4)
    kids = [quad_rect(6 + dx, 10 + dy, 5) for dx in (0, 1) for dy in (0, 1)]
    assert min(k.lon_lo for k in kids) == r.lon_lo
    assert max(k.lon_hi for k in kids) == r.lon_hi
    assert min(k.lat_lo for k in kids) == r.lat_lo
    assert max(k.lat_hi for k in kids) == r.lat_hi


def test_min_level_zero_allows_whole_polygon_cell():
    # A tiny polygon fully inside one level-10 cell: covering at
    # min_level=0 may be a single coarse cell.
    tiny = Polygon(
        [(-73.9801, 40.7501), (-73.9799, 40.7501), (-73.9799, 40.7503), (-73.9801, 40.7503)]
    )
    cells = exterior_covering(tiny, 20)
    assert len(cells) >= 1
    lvls = [cell_level(c) for c in cells]
    assert max(lvls) <= 20

"""Polygon -> cell coverings by recursive quadtree descent.

This is the only approximation step in the whole GeoBlocks pipeline: the
query polygon is replaced by a set of grid cells, and the paper's error
bound ("the maximum error is bound by the diagonal of a grid cell")
follows from the covering's max level. Exterior coverings keep every cell
that *intersects* the polygon (false positives only — the paper notes the
error is "always of positive nature"); interior coverings keep only cells
fully *contained* (false negatives only), used for the PHTree baseline's
conservative query mapping.

Cells in a covering are at levels ``min_level..max_level`` — a cell fully
inside the polygon is emitted as soon as it is at least ``min_level``
deep, which is what keeps covering sizes proportional to the polygon
*perimeter* (interior is covered by coarse cells) rather than its area.
"""
from repro.s2lite.cell import MAX_LEVEL, cell_id_from_quad
from repro.s2lite.polygon import Polygon, Rect

__all__ = ["exterior_covering", "interior_covering", "quad_rect"]


def quad_rect(x: int, y: int, level: int) -> Rect:
    """Lon/lat rectangle of the quadtree cell ``(x, y)`` at ``level``."""
    n = 1 << level
    w_lon, w_lat = 360.0 / n, 180.0 / n
    return Rect(
        -180.0 + x * w_lon,
        -90.0 + y * w_lat,
        -180.0 + (x + 1) * w_lon,
        -90.0 + (y + 1) * w_lat,
    )


def _root_quad(bbox: Rect, max_level: int):
    """Deepest single quadtree cell containing ``bbox``, capped at
    ``max_level`` — the descent start (equivalent to the paper's trie
    pruning to a covering root)."""
    x = y = 0
    level = 0
    while level < min(MAX_LEVEL, max_level):
        advanced = False
        for dx in (0, 1):
            for dy in (0, 1):
                cx, cy = 2 * x + dx, 2 * y + dy
                r = quad_rect(cx, cy, level + 1)
                if (
                    r.lon_lo <= bbox.lon_lo
                    and r.lon_hi >= bbox.lon_hi
                    and r.lat_lo <= bbox.lat_lo
                    and r.lat_hi >= bbox.lat_hi
                ):
                    x, y, level = cx, cy, level + 1
                    advanced = True
                    break
            if advanced:
                break
        if not advanced:
            break
    return x, y, level


def _cover(poly: Polygon, max_level: int, min_level: int, interior: bool):
    if not 0 <= max_level <= MAX_LEVEL:
        raise ValueError(f"max_level {max_level} out of range")
    if min_level > max_level:
        raise ValueError("min_level must be <= max_level")
    out = []
    x0, y0, l0 = _root_quad(poly.bbox, max_level)
    stack = [(x0, y0, l0)]
    while stack:
        x, y, level = stack.pop()
        rect = quad_rect(x, y, level)
        if not poly.intersects_rect(rect):
            continue
        if level >= min_level and poly.contains_rect(rect):
            out.append(cell_id_from_quad(x, y, level))
            continue
        if level >= max_level:
            if not interior:
                out.append(cell_id_from_quad(x, y, level))
            continue
        for dx in (0, 1):
            for dy in (0, 1):
                stack.append((2 * x + dx, 2 * y + dy, level + 1))
    out.sort()
    return out


def exterior_covering(poly: Polygon, max_level: int, min_level: int = 0):
    """Cells intersecting ``poly`` (superset of the polygon), sorted.

    This is the covering GeoBlocks and the BinarySearch/BTree baselines
    query with; its cells are what the StatsTrie records.
    """
    return _cover(poly, max_level, min_level, interior=False)


def interior_covering(poly: Polygon, max_level: int, min_level: int = 0):
    """Cells fully contained in ``poly`` (subset of the polygon), sorted."""
    return _cover(poly, max_level, min_level, interior=True)

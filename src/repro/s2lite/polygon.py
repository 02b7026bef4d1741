"""Planar polygon and rectangle geometry in lon/lat degrees.

Implements exactly the predicates the covering algorithm and baselines
need: point-in-polygon (ray casting, vectorized), rectangle/polygon
intersection and containment, and the interior-rectangle extraction the
paper uses to query the PHTree/RTree baselines ("we used S2 to get the
interior rectangle of the query polygon").

Polygons are simple (non-self-intersecting) rings given as (lon, lat)
vertex lists; boundaries follow ray-casting's half-open convention, which
is immaterial for the paper's error model (errors are cell-sized, not
point-sized).
"""
from dataclasses import dataclass

import numpy as np

__all__ = ["Rect", "Polygon"]


@dataclass(frozen=True)
class Rect:
    """Axis-aligned rectangle ``[lon_lo, lon_hi] x [lat_lo, lat_hi]``."""

    lon_lo: float
    lat_lo: float
    lon_hi: float
    lat_hi: float

    def contains_point(self, lon: float, lat: float) -> bool:
        return self.lon_lo <= lon <= self.lon_hi and self.lat_lo <= lat <= self.lat_hi

    def contains_points(self, lons, lats):
        lons, lats = np.asarray(lons), np.asarray(lats)
        return (
            (self.lon_lo <= lons)
            & (lons <= self.lon_hi)
            & (self.lat_lo <= lats)
            & (lats <= self.lat_hi)
        )

    def intersects(self, other: "Rect") -> bool:
        return not (
            other.lon_lo > self.lon_hi
            or other.lon_hi < self.lon_lo
            or other.lat_lo > self.lat_hi
            or other.lat_hi < self.lat_lo
        )

    def corners(self):
        return [
            (self.lon_lo, self.lat_lo),
            (self.lon_hi, self.lat_lo),
            (self.lon_hi, self.lat_hi),
            (self.lon_lo, self.lat_hi),
        ]

    @property
    def width(self) -> float:
        return self.lon_hi - self.lon_lo

    @property
    def height(self) -> float:
        return self.lat_hi - self.lat_lo


def _segments_intersect(p1, p2, q1, q2) -> bool:
    """Proper-or-touching intersection of segments ``p1p2`` and ``q1q2``."""

    def orient(a, b, c):
        v = (b[0] - a[0]) * (c[1] - a[1]) - (b[1] - a[1]) * (c[0] - a[0])
        return 0 if v == 0 else (1 if v > 0 else -1)

    def on_seg(a, b, c):
        return (
            min(a[0], b[0]) <= c[0] <= max(a[0], b[0])
            and min(a[1], b[1]) <= c[1] <= max(a[1], b[1])
        )

    o1, o2 = orient(p1, p2, q1), orient(p1, p2, q2)
    o3, o4 = orient(q1, q2, p1), orient(q1, q2, p2)
    if o1 != o2 and o3 != o4:
        return True
    if o1 == 0 and on_seg(p1, p2, q1):
        return True
    if o2 == 0 and on_seg(p1, p2, q2):
        return True
    if o3 == 0 and on_seg(q1, q2, p1):
        return True
    if o4 == 0 and on_seg(q1, q2, p2):
        return True
    return False


def _segment_intersects_rect(p1, p2, rect: Rect) -> bool:
    """True iff segment ``p1p2`` touches rectangle ``rect`` anywhere."""
    if rect.contains_point(*p1) or rect.contains_point(*p2):
        return True
    # Segment bbox reject.
    if (
        max(p1[0], p2[0]) < rect.lon_lo
        or min(p1[0], p2[0]) > rect.lon_hi
        or max(p1[1], p2[1]) < rect.lat_lo
        or min(p1[1], p2[1]) > rect.lat_hi
    ):
        return False
    c = rect.corners()
    return any(_segments_intersect(p1, p2, c[i], c[(i + 1) % 4]) for i in range(4))


class Polygon:
    """A simple polygon ring with the predicates GeoBlocks needs."""

    def __init__(self, vertices):
        v = np.asarray(vertices, dtype=np.float64)
        if v.ndim != 2 or v.shape[1] != 2 or v.shape[0] < 3:
            raise ValueError("polygon needs >= 3 (lon, lat) vertices")
        # Drop an explicitly closed ring's duplicate last vertex.
        if np.allclose(v[0], v[-1]) and v.shape[0] > 3:
            v = v[:-1]
        self.vertices = v
        self._lons = v[:, 0]
        self._lats = v[:, 1]
        self.bbox = Rect(
            float(self._lons.min()),
            float(self._lats.min()),
            float(self._lons.max()),
            float(self._lats.max()),
        )

    def __repr__(self):  # pragma: no cover - debugging aid
        return f"Polygon({len(self.vertices)} verts, bbox={self.bbox})"

    # -- point predicates -------------------------------------------------
    def contains_points(self, lons, lats):
        """Vectorized ray-casting point-in-polygon test.

        This is the *exact* membership predicate used by the oracle to
        measure the relative error of cell-covering answers.
        """
        lons = np.asarray(lons, dtype=np.float64)
        lats = np.asarray(lats, dtype=np.float64)
        x1, y1 = self._lons, self._lats
        x2, y2 = np.roll(x1, -1), np.roll(y1, -1)
        inside = np.zeros(lons.shape, dtype=bool)
        for i in range(len(x1)):
            xa, ya, xb, yb = x1[i], y1[i], x2[i], y2[i]
            if ya == yb:
                continue
            crosses = ((ya > lats) != (yb > lats)) & (
                lons < (xb - xa) * (lats - ya) / (yb - ya) + xa
            )
            inside ^= crosses
        return inside

    def contains_point(self, lon: float, lat: float) -> bool:
        return bool(self.contains_points(np.array([lon]), np.array([lat]))[0])

    # -- rectangle predicates --------------------------------------------
    def intersects_rect(self, rect: Rect) -> bool:
        """True iff the polygon's interior/boundary touches ``rect``."""
        if not self.bbox.intersects(rect):
            return False
        # Any rect corner inside the polygon.
        cx = np.array([c[0] for c in rect.corners()])
        cy = np.array([c[1] for c in rect.corners()])
        if self.contains_points(cx, cy).any():
            return True
        # Any polygon vertex inside the rect.
        if rect.contains_points(self._lons, self._lats).any():
            return True
        # Any edge crossing the rect.
        n = len(self.vertices)
        for i in range(n):
            p1 = (self._lons[i], self._lats[i])
            p2 = (self._lons[(i + 1) % n], self._lats[(i + 1) % n])
            if _segment_intersects_rect(p1, p2, rect):
                return True
        return False

    def contains_rect(self, rect: Rect) -> bool:
        """True iff ``rect`` lies entirely inside the polygon."""
        cx = np.array([c[0] for c in rect.corners()])
        cy = np.array([c[1] for c in rect.corners()])
        if not self.contains_points(cx, cy).all():
            return False
        # For a simple polygon, all corners inside + no boundary crossing
        # implies full containment.
        n = len(self.vertices)
        for i in range(n):
            p1 = (self._lons[i], self._lats[i])
            p2 = (self._lons[(i + 1) % n], self._lats[(i + 1) % n])
            if _segment_intersects_rect(p1, p2, rect):
                return False
        return True

    # -- derived geometry -------------------------------------------------
    def area(self) -> float:
        """Shoelace area in square degrees (orientation-independent)."""
        x, y = self._lons, self._lats
        x2, y2 = np.roll(x, -1), np.roll(y, -1)
        return float(abs(np.sum(x * y2 - x2 * y)) / 2.0)

    def centroid(self):
        """Area centroid (falls back to vertex mean for degenerate rings)."""
        x, y = self._lons, self._lats
        x2, y2 = np.roll(x, -1), np.roll(y, -1)
        cross = x * y2 - x2 * y
        a = np.sum(cross) / 2.0
        if abs(a) < 1e-15:
            return float(x.mean()), float(y.mean())
        cx = float(np.sum((x + x2) * cross) / (6.0 * a))
        cy = float(np.sum((y + y2) * cross) / (6.0 * a))
        return cx, cy

    def interior_rect(self, tol: float = 1e-3) -> Rect:
        """Largest-by-binary-search axis-aligned rectangle inside the
        polygon, centered on an interior point.

        Mirrors the paper's PHTree/RTree query mapping ("the interior
        rectangle of the query polygon ... covers fewer points than our
        approach"). Scale factor is found by bisection on a bbox-shaped
        rectangle around the centroid; if even a tiny rectangle does not
        fit (centroid outside a non-convex ring), falls back to a point
        probe along the bbox diagonals.
        """
        cx, cy = self.centroid()
        if not self.contains_point(cx, cy):
            cx, cy = self._find_interior_point()
        hw0 = max(self.bbox.width / 2.0, 1e-12)
        hh0 = max(self.bbox.height / 2.0, 1e-12)

        def rect_at(s: float) -> Rect:
            return Rect(cx - s * hw0, cy - s * hh0, cx + s * hw0, cy + s * hh0)

        lo, hi = 0.0, 1.0
        if self.contains_rect(rect_at(1.0)):
            return rect_at(1.0)
        while hi - lo > tol:
            mid = (lo + hi) / 2.0
            if self.contains_rect(rect_at(mid)):
                lo = mid
            else:
                hi = mid
        return rect_at(lo) if lo > 0 else Rect(cx, cy, cx, cy)

    def _find_interior_point(self):
        """Sample bbox grid points until one is inside the polygon."""
        for n in (5, 11, 23, 47):
            xs = np.linspace(self.bbox.lon_lo, self.bbox.lon_hi, n + 2)[1:-1]
            ys = np.linspace(self.bbox.lat_lo, self.bbox.lat_hi, n + 2)[1:-1]
            gx, gy = np.meshgrid(xs, ys)
            mask = self.contains_points(gx.ravel(), gy.ravel())
            if mask.any():
                i = int(np.argmax(mask))
                return float(gx.ravel()[i]), float(gy.ravel()[i])
        # Degenerate sliver: fall back to the first vertex.
        return float(self._lons[0]), float(self._lats[0])

"""Exact polygon aggregation via point-in-polygon — the ground truth.

GeoBlocks answers are exact *with respect to the cell covering* but
approximate with respect to the polygon itself. The paper's relative
error metric is

    |# tuples in query result - # tuples in polygon| / # tuples in polygon

computed against the true point-in-polygon answer; this module provides
that ground truth (numpy ray casting; also mirrored in DuckDB SQL by the
oracle tests).
"""
import numpy as np
import pandas as pd

from repro.s2lite.polygon import Polygon

__all__ = ["exact_mask", "exact_aggregates", "relative_count_error"]


def exact_mask(taxi: pd.DataFrame, poly: Polygon) -> np.ndarray:
    """Boolean mask of rides whose drop-off lies inside ``poly``."""
    return poly.contains_points(
        taxi["dropoff_lon"].to_numpy(), taxi["dropoff_lat"].to_numpy()
    )


def exact_aggregates(taxi: pd.DataFrame, poly: Polygon, specs) -> dict:
    """Exact values for ``specs`` (list of ``(col, op)``) over the rides
    inside ``poly``. Empty regions yield count/sum 0 and min/max None."""
    m = exact_mask(taxi, poly)
    sub = taxi.loc[m]
    out = {}
    for col, op in specs:
        if op == "count":
            out[(col, op)] = int(m.sum())
        elif len(sub) == 0:
            out[(col, op)] = 0.0 if op == "sum" else None
        elif op == "sum":
            out[(col, op)] = float(sub[col].sum())
        elif op == "min":
            out[(col, op)] = float(sub[col].min())
        elif op == "max":
            out[(col, op)] = float(sub[col].max())
        elif op == "avg":
            out[(col, op)] = float(sub[col].mean())
        else:
            raise ValueError(f"unknown aggregate op {op!r}")
    return out


def relative_count_error(approx_count: int, exact_count: int) -> float:
    """The paper's relative error; defined as 0 when both are empty."""
    if exact_count == 0:
        return 0.0 if approx_count == 0 else float("inf")
    return abs(approx_count - exact_count) / exact_count

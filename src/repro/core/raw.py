"""Extract & reorganize: sorted columnar raw storage.

The paper's preprocessing ("extract and reorganize") maps each point to
its linear spatial key, drops non-aggregatable columns, and sorts the
remaining columns by key so that each grid cell's tuples are contiguous.
The resulting :class:`RawTable` is shared by the GeoBlock build *and* by
the BinarySearch/BTree baselines — exactly as in the paper, where all
sorted baselines operate on the same columnar data.
"""
import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.s2lite.cell import parent, point_keys_from_latlon


@dataclass
class RawTable:
    """Columnar point data sorted by level-30 spatial key."""

    keys: np.ndarray  # int64, sorted point keys (odd leaf ids)
    columns: dict  # col name -> float64/int64 array, same order as keys
    lats: np.ndarray
    lons: np.ndarray
    timings: dict = field(default_factory=dict)  # phase -> seconds

    def __len__(self) -> int:
        return len(self.keys)

    @property
    def value_cols(self):
        return list(self.columns)

    def size_bytes(self) -> int:
        """Bytes of the queryable payload (key column + value columns),
        the denominator of the paper's relative-overhead figures."""
        return int(
            self.keys.nbytes + sum(a.nbytes for a in self.columns.values())
        )

    def cells_at(self, level: int) -> np.ndarray:
        """Cell id at ``level`` for every tuple (vectorized parent)."""
        return np.asarray(parent(self.keys, level), dtype=np.int64)


def extract_and_reorganize(
    taxi: pd.DataFrame,
    value_cols,
    *,
    lat_col: str = "dropoff_lat",
    lon_col: str = "dropoff_lon",
    predicate=None,
) -> RawTable:
    """Build a :class:`RawTable` from raw ride records.

    ``predicate``, if given, is a boolean-mask function applied before
    sorting — the paper's pre-defined filter predicates ("e.g., WHERE
    fare_amount > 10"); GeoBlocks supports no filters after this phase.
    Records the sort wall-time in ``timings['sort']`` (this is the
    paper's "Sorting" column in Table 1: key extraction + reordering of
    all columns).
    """
    if predicate is not None:
        taxi = taxi.loc[predicate(taxi)]
    t0 = time.perf_counter()
    lats = taxi[lat_col].to_numpy(dtype=np.float64)
    lons = taxi[lon_col].to_numpy(dtype=np.float64)
    keys = np.asarray(point_keys_from_latlon(lats, lons), dtype=np.int64)
    order = np.argsort(keys, kind="stable")
    keys = keys[order]
    columns = {
        c: np.ascontiguousarray(taxi[c].to_numpy(dtype=np.float64)[order])
        for c in value_cols
    }
    lats, lons = lats[order], lons[order]
    sort_s = time.perf_counter() - t0
    return RawTable(
        keys=keys, columns=columns, lats=lats, lons=lons, timings={"sort": sort_s}
    )

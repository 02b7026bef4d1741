"""The GeoBlock storage layout and query algorithms (paper section 3).

A :class:`GeoBlock` holds, per non-empty grid cell at the configured
block level, a "CellBlock Header": spatial key, offset of the cell's
first tuple in the sorted raw data, tuple count, and min/max/sum for
every retained column — all as parallel sorted numpy arrays (the
columnar equivalent of the paper's contiguous header array). A
block-wide header (global key range + global aggregates) drives the
pre-query check.

Query algorithms:

- **SELECT (V1)** — for each covering cell, an upper-bound binary search
  locates the first contained CellBlock Header; the following headers
  are combined until the cell's descendant range ends. Cost is
  proportional to the number of CellBlocks scanned, as in the paper
  (slice reductions, deliberately not prefix sums).
- **COUNT** — reads only the first and last contained header:
  ``offset_last + count_last - offset_first``.
- **SELECT (V2, adaptive)** — records every query cell in a
  :class:`~repro.core.stats_trie.StatsTrie`; once an
  :class:`~repro.core.agg_trie.AggregateTrie` has been built, a query
  cell is answered from the cached aggregate if present, else by
  combining cached *direct children* with V1 scans of the missing ones,
  else by plain V1 (Figure 5 of the paper).
"""
import math
import time

import numpy as np

from repro.core.raw import RawTable
from repro.s2lite.cell import children, range_max, range_min
from repro.s2lite.covering import exterior_covering

__all__ = ["GeoBlock", "AdaptiveGeoBlock", "AggAccumulator", "needed_stats"]

_STATS = ("min", "max", "sum")


def gather_ranges(i0, i1):
    """Indices of all elements in the union of ``[i0[j], i1[j])`` ranges.

    The vectorized equivalent of the paper's per-cell scan loop: one
    reduction over ``arr[gather_ranges(i0, i1)]`` touches exactly the
    elements the covering cells select — cost stays proportional to
    elements scanned, without Python-interpreter overhead per cell (the
    same courtesy the C++ implementation gets from the compiler). Used
    by the GeoBlock (over CellBlock headers) and by the
    BinarySearch/BTree baselines (over raw tuples), so the comparison
    stays fair. Segments must be non-empty (``i1 > i0``).
    """
    lens = i1 - i0
    shift = np.concatenate(([0], np.cumsum(lens)[:-1]))
    return np.arange(int(lens.sum()), dtype=np.int64) + np.repeat(i0 - shift, lens)


def needed_stats(specs):
    """Map aggregate specs to the per-column stats that must be combined
    (``avg`` needs sum+count; ``count`` needs no column stats)."""
    cols = {}
    need_count = False
    for col, op in specs:
        if op == "count":
            need_count = True
        elif op in ("min", "max", "sum"):
            cols.setdefault(col, set()).add(op)
        elif op == "avg":
            cols.setdefault(col, set()).add("sum")
            need_count = True
        else:
            raise ValueError(f"unknown aggregate op {op!r}")
    return cols, need_count


class AggAccumulator:
    """Running combination of CellBlock aggregates for one query."""

    def __init__(self, cols):
        self.count = 0
        self.mins = {c: math.inf for c in cols}
        self.maxs = {c: -math.inf for c in cols}
        self.sums = {c: 0.0 for c in cols}
        self._cols = cols

    def merge_row(self, count, mins, maxs, sums):
        """Merge one pre-combined aggregate row (e.g. a cached cell)."""
        self.count += count
        for c in self._cols:
            if c in mins and mins[c] is not None:
                self.mins[c] = min(self.mins[c], mins[c])
            if c in maxs and maxs[c] is not None:
                self.maxs[c] = max(self.maxs[c], maxs[c])
            if c in sums:
                self.sums[c] += sums[c]

    def finalize(self, specs):
        """Project the accumulator onto the requested ``specs``."""
        empty = self.count == 0
        out = {}
        for col, op in specs:
            if op == "count":
                out[(col, op)] = int(self.count)
            elif op == "sum":
                out[(col, op)] = 0.0 if empty else float(self.sums[col])
            elif op == "min":
                out[(col, op)] = None if empty else float(self.mins[col])
            elif op == "max":
                out[(col, op)] = None if empty else float(self.maxs[col])
            elif op == "avg":
                out[(col, op)] = (
                    None if empty else float(self.sums[col]) / self.count
                )
        return out


class GeoBlock:
    """The non-adaptive GeoBlock (paper's "Blocks V1")."""

    # Per-CellBlock header bytes: key + offset + count (8 bytes each) plus
    # min/max/sum per column — the size model behind the paper's overhead
    # figures and the AggregateTrie threshold accounting.
    _FIXED_HEADER_FIELDS = 3

    def __init__(self, *, level, keys, offsets, counts, aggs, value_cols, key_min, key_max):
        self.level = level
        self.keys = keys  # sorted cell ids at `level`
        self.offsets = offsets
        self.counts = counts
        self.aggs = aggs  # {col: {"min": arr, "max": arr, "sum": arr}}
        self.value_cols = list(value_cols)
        self.key_min = key_min  # smallest point key in the block
        self.key_max = key_max
        total = AggAccumulator(self.value_cols)
        if len(keys):
            total.merge_row(
                int(counts.sum()),
                {c: float(aggs[c]["min"].min()) for c in value_cols},
                {c: float(aggs[c]["max"].max()) for c in value_cols},
                {c: float(aggs[c]["sum"].sum()) for c in value_cols},
            )
        self.block_header = total

    # -- construction -----------------------------------------------------
    @classmethod
    def build_from_raw(cls, raw: RawTable, level: int) -> "GeoBlock":
        """Single pass over the sorted raw data (the paper's "Building"
        phase — Table 1's second column). Wall time lands in
        ``raw.timings['build']``."""
        t0 = time.perf_counter()
        cells = raw.cells_at(level)
        n = len(cells)
        if n == 0:
            raise ValueError("cannot build a GeoBlock over empty data")
        starts = np.flatnonzero(np.r_[True, np.diff(cells) != 0])
        keys = cells[starts]
        counts = np.diff(np.r_[starts, n]).astype(np.int64)
        aggs = {}
        for c, arr in raw.columns.items():
            aggs[c] = {
                "min": np.minimum.reduceat(arr, starts),
                "max": np.maximum.reduceat(arr, starts),
                "sum": np.add.reduceat(arr, starts),
            }
        blk = cls(
            level=level,
            keys=keys,
            offsets=starts.astype(np.int64),
            counts=counts,
            aggs=aggs,
            value_cols=list(raw.columns),
            key_min=int(raw.keys[0]),
            key_max=int(raw.keys[-1]),
        )
        raw.timings["build"] = time.perf_counter() - t0
        return blk

    # -- sizes ------------------------------------------------------------
    @property
    def n_cells(self) -> int:
        return len(self.keys)

    def header_size_bytes(self) -> int:
        per_cell = 8 * (self._FIXED_HEADER_FIELDS + 3 * len(self.value_cols))
        return per_cell * self.n_cells

    def aggregate_row_bytes(self) -> int:
        """Bytes of one cached aggregate (count + min/max/sum per column)
        in the AggregateTrie's aggregate storage."""
        return 8 * (1 + 3 * len(self.value_cols))

    def size_bytes(self) -> int:
        return self.header_size_bytes()

    # -- covering ---------------------------------------------------------
    def cover(self, polygon, min_level: int = 0):
        """Exterior covering clamped to the block level (the paper
        requires the covering's max level to be at most the CellBlock
        level)."""
        return exterior_covering(polygon, self.level, min_level=min_level)

    # -- V1 query algorithm ----------------------------------------------
    def _pre_check(self, rmin: int, rmax: int) -> bool:
        """Block-wide key-range check: skip cells entirely outside."""
        return not (rmax < self.key_min or rmin > self.key_max)

    def _combine_cell(self, cid: int, acc: AggAccumulator, cols):
        """Combine all CellBlock aggregates under query cell ``cid``.

        Short header runs (the common case: covering cells at the block
        level hold exactly one CellBlock) are combined with plain Python
        indexing — a numpy reduction call costs ~2.5us regardless of
        slice length, which would make a 1-header combine as expensive
        as a 1000-header one and flatten the very cost structure the
        paper measures. Cost stays proportional to headers scanned.
        """
        rmin, rmax = range_min(cid), range_max(cid)
        if not self._pre_check(rmin, rmax):
            return
        i0 = int(np.searchsorted(self.keys, rmin, side="left"))
        i1 = int(np.searchsorted(self.keys, rmax, side="right"))
        n = i1 - i0
        if n <= 0:
            return
        if n <= 8:
            counts = self.counts
            total = 0
            for j in range(i0, i1):
                total += counts[j]
            acc.count += int(total)
            for c in cols:
                stats = cols[c]
                a = self.aggs[c]
                if "min" in stats:
                    arr, best = a["min"], acc.mins[c]
                    for j in range(i0, i1):
                        v = arr[j]
                        if v < best:
                            best = v
                    acc.mins[c] = best
                if "max" in stats:
                    arr, best = a["max"], acc.maxs[c]
                    for j in range(i0, i1):
                        v = arr[j]
                        if v > best:
                            best = v
                    acc.maxs[c] = best
                if "sum" in stats:
                    arr = a["sum"]
                    t = 0.0
                    for j in range(i0, i1):
                        t += arr[j]
                    acc.sums[c] += t
            return
        acc.count += int(self.counts[i0:i1].sum())
        for c in cols:
            stats = cols[c]
            a = self.aggs[c]
            if "min" in stats:
                acc.mins[c] = min(acc.mins[c], float(a["min"][i0:i1].min()))
            if "max" in stats:
                acc.maxs[c] = max(acc.maxs[c], float(a["max"][i0:i1].max()))
            if "sum" in stats:
                acc.sums[c] += float(a["sum"][i0:i1].sum())

    def _combine_cells_vectorized(self, cells, acc: AggAccumulator, cols):
        """Batch version of :meth:`_combine_cell` for a sorted, disjoint
        cell list: one searchsorted pass for all range bounds, then
        segment reductions over the header arrays."""
        cells = np.asarray(cells, dtype=np.int64)
        lsb = cells & -cells
        rmin = cells - lsb + 1
        rmax = cells + lsb - 1
        i0 = self.keys.searchsorted(rmin, side="left")
        i1 = self.keys.searchsorted(rmax, side="right")
        m = i1 > i0
        if not m.any():
            return
        i0, i1 = i0[m], i1[m]
        # Contiguity of headers makes COUNT an O(1)-per-cell offset
        # difference, exactly the specialized COUNT-query formula.
        acc.count += int(
            (self.offsets[i1 - 1] + self.counts[i1 - 1] - self.offsets[i0]).sum()
        )
        idx = gather_ranges(i0, i1)
        for c in cols:
            stats = cols[c]
            a = self.aggs[c]
            if "min" in stats:
                acc.mins[c] = min(acc.mins[c], float(a["min"][idx].min()))
            if "max" in stats:
                acc.maxs[c] = max(acc.maxs[c], float(a["max"][idx].max()))
            if "sum" in stats:
                acc.sums[c] += float(a["sum"][idx].sum())

    def query_cells(self, cells, specs, *, batch: bool = True):
        """SELECT over an explicit list of covering cells.

        ``batch=True`` (default) combines all cells with one vectorized
        pass — the idiomatic numpy execution used for the engine
        comparisons. ``batch=False`` processes covering cells one at a
        time, reproducing the paper's query-at-a-time C++ cost structure
        (binary search + header scan per cell); the adaptive experiments
        (Figs. 9/10) use this mode because the V1-vs-V2 difference lives
        precisely in those per-cell costs. Results are identical.
        """
        cols, _ = needed_stats(specs)
        acc = AggAccumulator(list(cols))
        if batch and len(cells) >= 4:
            self._combine_cells_vectorized(cells, acc, cols)
        else:
            for cid in cells:
                self._combine_cell(int(cid), acc, cols)
        return acc.finalize(specs)

    def query_select(self, polygon, specs):
        """SELECT over a query polygon (covering computed here)."""
        return self.query_cells(self.cover(polygon), specs)

    def count_cells(self, cells) -> int:
        """Specialized COUNT: first/last contained header only
        (``offset_last + count_last - offset_first``)."""
        total = 0
        for cid in cells:
            rmin, rmax = range_min(int(cid)), range_max(int(cid))
            if not self._pre_check(rmin, rmax):
                continue
            i0 = int(np.searchsorted(self.keys, rmin, side="left"))
            j = int(np.searchsorted(self.keys, rmax, side="right")) - 1
            if j < i0:
                continue
            total += int(self.offsets[j] + self.counts[j] - self.offsets[i0])
        return total

    def query_count(self, polygon) -> int:
        return self.count_cells(self.cover(polygon))

    def cell_aggregate_row(self, cid: int):
        """Full aggregate row (count + min/max/sum of every column) for
        one query cell — what the AggregateTrie caches."""
        cols = {c: {"min", "max", "sum"} for c in self.value_cols}
        acc = AggAccumulator(self.value_cols)
        self._combine_cell(int(cid), acc, cols)
        empty = acc.count == 0
        return (
            acc.count,
            {c: (None if empty else acc.mins[c]) for c in self.value_cols},
            {c: (None if empty else acc.maxs[c]) for c in self.value_cols},
            {c: acc.sums[c] for c in self.value_cols},
        )


class AdaptiveGeoBlock(GeoBlock):
    """GeoBlock V2: StatsTrie workload tracking + AggregateTrie cache."""

    def __init__(self, **kw):
        super().__init__(**kw)
        from repro.core.stats_trie import StatsTrie

        self.stats = StatsTrie(self.key_min, self.key_max)
        self.agg_trie = None

    @classmethod
    def from_block(cls, blk: GeoBlock) -> "AdaptiveGeoBlock":
        return cls(
            level=blk.level,
            keys=blk.keys,
            offsets=blk.offsets,
            counts=blk.counts,
            aggs=blk.aggs,
            value_cols=blk.value_cols,
            key_min=blk.key_min,
            key_max=blk.key_max,
        )

    def build_aggregate_trie(self, threshold: float) -> None:
        """Materialize the AggregateTrie from collected statistics.

        ``threshold`` is the paper's aggregate threshold: the relative
        size overhead allowed, as a fraction of the GeoBlock header size.
        """
        from repro.core.agg_trie import AggregateTrie

        self.agg_trie = AggregateTrie.build(self, self.stats, threshold)

    def _query_cells_percell(self, cells, specs):
        """Query-at-a-time adapted SELECT — the paper's Figure 5 verbatim:
        per covering cell, record stats, probe the trie, use the cached
        aggregate / cached direct children / old algorithm."""
        cols, _ = needed_stats(specs)
        acc = AggAccumulator(list(cols))
        trie = self.agg_trie
        for cid in cells:
            cid = int(cid)
            self.stats.record(cid)
            if trie is not None:
                row = trie.get(cid)
                if row is not None:
                    acc.merge_row(row[0], row[1], row[2], row[3])
                    continue
                if trie.has_node(cid):
                    lsb = cid & -cid
                    if 30 - (lsb.bit_length() - 1) // 2 < self.level:
                        kids = children(cid)
                        kid_rows = [trie.get(k) for k in kids]
                        if any(r is not None for r in kid_rows):
                            for k, r in zip(kids, kid_rows):
                                if r is not None:
                                    acc.merge_row(r[0], r[1], r[2], r[3])
                                else:
                                    self._combine_cell(k, acc, cols)
                            continue
            self._combine_cell(cid, acc, cols)
        return acc.finalize(specs)

    def query_cells(self, cells, specs, *, batch: bool = True):
        """Adapted SELECT (paper Figure 5): cached cells resolve to slots
        in the AggregateTrie's contiguous aggregate storage and are
        merged with one vectorized reduction; uncached ones (including
        uncached children of partially-cached parents) fall back to the
        old algorithm, batched into one vectorized combine.

        ``batch=False`` runs the query-at-a-time variant instead (see
        :meth:`GeoBlock.query_cells` for why both exist).
        """
        if not batch:
            return self._query_cells_percell(cells, specs)
        cols, _ = needed_stats(specs)
        acc = AggAccumulator(list(cols))
        trie = self.agg_trie
        arr = np.asarray(cells, dtype=np.int64)
        self.stats.record_many(arr)
        if trie is None or len(trie.rows) == 0:
            slot_arr = np.empty(0, dtype=np.int64)
            fallback = arr
        else:
            # Batch trie probe: membership of every query cell in the
            # cached-id array (one searchsorted for the whole covering).
            n = len(trie.sorted_ids)
            pos = np.minimum(trie.sorted_ids.searchsorted(arr), n - 1)
            hit = trie.sorted_ids[pos] == arr
            slot_arr = trie.sorted_slots[pos[hit]]
            miss = arr[~hit]
            # Misses whose *direct children* hold cached aggregates can
            # still combine them (Figure 5); all other misses go straight
            # to the old algorithm (the paper aborts the probe there; we
            # additionally skip probing cells whose allocated node
            # provably has no aggregated direct child — same results).
            cands = trie.child_parent_ids
            if len(miss) and len(cands):
                npos = np.minimum(cands.searchsorted(miss), len(cands) - 1)
                has_node = cands[npos] == miss
            else:
                has_node = np.zeros(len(miss), dtype=bool)
            fallback = miss[~has_node]
            node_miss = miss[has_node]
            if len(node_miss):
                extra_slots = []
                extra_fallback = []
                slot_get = trie.slot_of.get
                for cid in node_miss:
                    cid = int(cid)
                    lsb = cid & -cid
                    if 30 - (lsb.bit_length() - 1) // 2 < self.level:
                        kids = children(cid)
                        kid_slots = [slot_get(k) for k in kids]
                        if any(s2 is not None for s2 in kid_slots):
                            for k, s2 in zip(kids, kid_slots):
                                if s2 is not None:
                                    extra_slots.append(s2)
                                else:
                                    extra_fallback.append(k)
                            continue
                    extra_fallback.append(cid)
                if extra_slots:
                    slot_arr = np.concatenate(
                        [slot_arr, np.asarray(extra_slots, dtype=np.int64)]
                    )
                if extra_fallback:
                    fallback = np.concatenate(
                        [fallback, np.asarray(extra_fallback, dtype=np.int64)]
                    )
        if len(slot_arr):
            acc.count += int(trie.counts_arr[slot_arr].sum())
            for c in cols:
                stats = cols[c]
                if "min" in stats:
                    acc.mins[c] = min(acc.mins[c], float(trie.mins_arr[c][slot_arr].min()))
                if "max" in stats:
                    acc.maxs[c] = max(acc.maxs[c], float(trie.maxs_arr[c][slot_arr].max()))
                if "sum" in stats:
                    acc.sums[c] += float(trie.sums_arr[c][slot_arr].sum())
        if len(fallback) >= 4:
            self._combine_cells_vectorized(fallback, acc, cols)
        else:
            for cid in fallback:
                self._combine_cell(int(cid), acc, cols)
        return acc.finalize(specs)

    def size_bytes(self) -> int:
        extra = self.agg_trie.size_bytes() if self.agg_trie is not None else 0
        return self.header_size_bytes() + extra

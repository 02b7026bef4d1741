"""StatsTrie — workload statistics over query cells (paper section 3.4).

The paper stores per-cell hit counters in a prefix-pruned 4-ary trie so
that all previously seen query cells can be scored. The information
content of that trie is a map ``cell id -> hit count`` plus the pruned
root; we keep exactly that (a Python dict keyed by cell id — the id *is*
the prefix path, so the trie encoding is a storage optimization, not a
semantic one; see DESIGN.md section 4.5).

Scoring ("a very rudimentary metric", quoted from the paper): score =
own hits + direct parent's hits; candidates ranked by descending score,
then ascending level (coarser first), then ascending spatial key — the
exact reproducibility tie-break the paper specifies.
"""
from collections import Counter

from repro.s2lite.cell import cell_level, common_ancestor, parent, range_max, range_min

__all__ = ["StatsTrie"]


class StatsTrie:
    def __init__(self, key_min: int, key_max: int):
        # Prune to the deepest single cell covering the whole block: query
        # cells outside it can never touch the block (the pre-query check
        # answers them in O(1)), so not tracking them loses nothing.
        self.root = common_ancestor(key_min, key_max)
        self.root_level = cell_level(self.root)
        self._rmin = range_min(self.root)
        self._rmax = range_max(self.root)
        self.hits = Counter()

    def record(self, cid: int) -> None:
        """Count one query of cell ``cid`` (ignored if disjoint from the
        block's covering root)."""
        cid = int(cid)
        if range_max(cid) < self._rmin or range_min(cid) > self._rmax:
            return
        self.hits[cid] = self.hits.get(cid, 0) + 1

    def record_many(self, cells) -> None:
        """Record a whole covering at once — the per-query fast path of
        the adapted algorithm. ``cells`` may be a list of ints or an
        int64 numpy array; the range filter runs vectorized and the
        counter update is a single C-level pass."""
        import numpy as np

        arr = np.asarray(cells, dtype=np.int64)
        if len(arr) == 0:
            return
        lsb = arr & -arr
        m = ~((arr + lsb - 1 < self._rmin) | (arr - lsb + 1 > self._rmax))
        self.hits.update(arr[m].tolist())

    def total_hits(self) -> int:
        return sum(self.hits.values())

    def score(self, cid: int) -> int:
        """Own hits plus the direct parent's hits."""
        own = self.hits.get(cid, 0)
        lvl = cell_level(cid)
        if lvl == 0:
            return own
        return own + self.hits.get(parent(cid, lvl - 1), 0)

    def ranked_cells(self):
        """All seen cells ordered by (-score, level, key) — the insertion
        order for the AggregateTrie."""
        return sorted(
            self.hits, key=lambda c: (-self.score(c), cell_level(c), c)
        )

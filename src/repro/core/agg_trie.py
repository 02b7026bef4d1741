"""AggregateTrie — cached aggregates for popular query cells.

The paper stores the cache in-place between the GeoBlock header and the
raw data: a compact 4-ary trie (two 32-bit offsets per node, children
always allocated four-at-a-time) pointing into an aggregate store, with
total size capped at a user threshold expressed as a fraction of the
GeoBlock header size. We keep the cache as dicts keyed by cell id but
reproduce the paper's *byte accounting* exactly — 4 x 8 bytes whenever a
node's child block is first allocated, plus one full aggregate row per
cached cell — because the accounting is what decides which cells fit
under a given threshold (the measured quantity in Figures 9/10).

Insertion order is the StatsTrie ranking; "we can simply insert the most
relevant unaggregated cell until the reserved area is filled".
"""
import numpy as np

from repro.s2lite.cell import cell_level, contains, parent

__all__ = ["AggregateTrie"]

_NODE_BYTES = 8  # two 32-bit ints per trie node
_CHILD_BLOCK_BYTES = 4 * _NODE_BYTES  # children are allocated 4 at a time


class AggregateTrie:
    def __init__(self, root: int, budget_bytes: int, agg_row_bytes: int):
        self.root = root
        self.root_level = cell_level(root)
        self.budget_bytes = budget_bytes
        self.agg_row_bytes = agg_row_bytes
        self.nodes = {root}  # cells with an allocated trie node
        self.rows = {}  # cell id -> (count, mins, maxs, sums)
        self.used_bytes = _NODE_BYTES  # the root node itself

    # -- construction -----------------------------------------------------
    @classmethod
    def build(cls, block, stats, threshold: float) -> "AggregateTrie":
        """Fill the trie with the highest-ranked cells that fit in
        ``threshold * header_size`` bytes."""
        if threshold < 0:
            raise ValueError("threshold must be >= 0")
        trie = cls(
            root=stats.root,
            budget_bytes=int(threshold * block.header_size_bytes()),
            agg_row_bytes=block.aggregate_row_bytes(),
        )
        for cid in stats.ranked_cells():
            # Cells finer than the block level cannot be cached (no finer
            # aggregates exist); cells outside the root never reach here.
            if cell_level(cid) > block.level:
                continue
            if not contains(trie.root, cid) and cid != trie.root:
                continue
            if not trie._try_insert(cid, block):
                # The paper fills in strict rank order and stops at the
                # first cell that no longer fits (strict order guarantee).
                break
        trie._finalize(block)
        return trie

    def _finalize(self, block) -> None:
        """Lay the cached aggregates out as contiguous arrays (the
        paper's aggregate storage, addressed by trie offsets): the
        adapted query algorithm merges N cached cells with vectorized
        reductions over slot indices instead of N Python-level row
        merges. Empty cells store neutral elements (inf/-inf/0) so they
        vanish under min/max/sum."""
        n = len(self.rows)
        self.slot_of = {}
        self.counts_arr = np.zeros(n, dtype=np.int64)
        self.mins_arr = {c: np.full(n, np.inf) for c in block.value_cols}
        self.maxs_arr = {c: np.full(n, -np.inf) for c in block.value_cols}
        self.sums_arr = {c: np.zeros(n) for c in block.value_cols}
        for slot, (cid, (count, mins, maxs, sums)) in enumerate(self.rows.items()):
            self.slot_of[cid] = slot
            self.counts_arr[slot] = count
            for c in block.value_cols:
                if mins[c] is not None:
                    self.mins_arr[c][slot] = mins[c]
                if maxs[c] is not None:
                    self.maxs_arr[c][slot] = maxs[c]
                self.sums_arr[c][slot] = sums[c]
        # Sorted-id views for batch probes: searchsorted membership is
        # the vectorized equivalent of the paper's per-cell trie descent.
        ids = np.fromiter(self.rows.keys(), dtype=np.int64, count=n)
        order = np.argsort(ids)
        self.sorted_ids = ids[order]
        self.sorted_slots = np.arange(n, dtype=np.int64)[order]
        self.node_ids = np.fromiter(
            sorted(self.nodes), dtype=np.int64, count=len(self.nodes)
        )
        # Parents with at least one *aggregated direct child*: the only
        # uncached query cells for which the children-combination path of
        # the adapted algorithm can beat the plain fallback. Probing this
        # set instead of all allocated nodes skips the guaranteed-futile
        # child lookups that sibling allocation would otherwise cause.
        parents = set()
        for cid in self.rows:
            lvl = cell_level(cid)
            if lvl > self.root_level:
                parents.add(parent(cid, lvl - 1))
        self.child_parent_ids = np.fromiter(
            sorted(parents), dtype=np.int64, count=len(parents)
        )

    def _path_cost_bytes(self, cid: int) -> int:
        """Bytes of new trie nodes needed to reach ``cid``: one 4-child
        block per path node whose children are not yet allocated."""
        cost = 0
        lvl = cell_level(cid)
        # Walk from the cell up to the root; each missing node on the way
        # implies its parent's child block must be allocated.
        l = lvl
        while l > self.root_level:
            node = parent(cid, l)
            if node in self.nodes:
                break
            cost += _CHILD_BLOCK_BYTES
            l -= 1
        return cost

    def _try_insert(self, cid: int, block) -> bool:
        cost = self._path_cost_bytes(cid) + self.agg_row_bytes
        if self.used_bytes + cost > self.budget_bytes:
            return False
        # Allocate path nodes (all four siblings at each new level).
        lvl = cell_level(cid)
        for l in range(self.root_level, lvl + 1):
            node = parent(cid, l)
            if node not in self.nodes:
                if l > self.root_level:
                    p = parent(cid, l - 1)
                    for sib in _children_of(p):
                        self.nodes.add(sib)
                else:
                    self.nodes.add(node)
        self.rows[cid] = block.cell_aggregate_row(cid)
        self.used_bytes += cost
        return True

    # -- queries ----------------------------------------------------------
    def get(self, cid: int):
        """Cached aggregate row for ``cid`` or None."""
        return self.rows.get(int(cid))

    def has_node(self, cid: int) -> bool:
        """Whether the trie probe reaches a node for ``cid`` (if not, the
        adapted algorithm aborts and falls back to V1)."""
        return int(cid) in self.nodes

    def __len__(self) -> int:
        return len(self.rows)

    def size_bytes(self) -> int:
        return self.used_bytes


def _children_of(cid: int):
    from repro.s2lite.cell import children

    return children(cid)

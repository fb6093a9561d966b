"""RP-Trie construction (paper §III-B, §III-C, Appendix B).

Three build modes:

* ``"basic"``  — insert the full z-value sequence in trajectory order
  (required for order-sensitive measures: Frechet, DTW, ERP, EDR, LCSS).
* ``"dedup"``  — order-independent measures only (Hausdorff): keep one
  z-value per distinct cell, first-occurrence order (the *unoptimized*
  trie of Fig. 7).
* ``"opt"``    — ``dedup`` plus greedy hitting-set z-value re-arrangement
  (§III-C / Appendix B): each level's children are chosen most-frequent-
  first over the remaining z-value sets, using the C(Z) − C(Z^z1)
  frequency-difference bookkeeping from the appendix.

Every node carries an ``HR[N_p]`` (min,max) pivot-distance array; every
leaf carries the trajectory ids and ``D_max`` (max distance from stored
trajectories to the node's reference trajectory).
"""
from __future__ import annotations

import sys
from collections import Counter
from typing import Callable, Sequence

import numpy as np

from .zorder import Grid, ref_points, ref_trajectory

# Tries are as deep as the longest trajectory (≤1000 after the paper's
# preprocessing); (cloud)pickling the linked Node structure inside Spark
# workers recurses per node, so lift CPython's default 1000-frame limit
# here — this module is imported by every worker that touches a trie.
sys.setrecursionlimit(max(sys.getrecursionlimit(), 100_000))


class Leaf:
    """$-terminated leaf: trajectory ids + D_max + pivot HR (§III-B)."""

    __slots__ = ("tids", "dmax", "hr")

    def __init__(self, n_pivots: int):
        self.tids: list[int] = []
        self.dmax: float = 0.0
        self.hr: np.ndarray | None = (
            _empty_hr(n_pivots) if n_pivots else None
        )


class Node:
    """Internal trie node labelled with a z-value.

    ``chain_*`` attributes implement path compression for the search:
    a child node carries the reference points / cell rects of the maximal
    single-child, leaf-free run it starts, and ``chain_end`` is the run's
    last node (the next branch/leaf point). Interior chain nodes share
    the same subtree, hence the same HR, so bounds are unaffected.
    """

    __slots__ = (
        "z", "children", "leaf", "hr", "refpoint", "rect",
        "depth", "max_suffix",
        "child_nodes", "chain_refpts", "chain_rects", "chain_end",
    )

    def __init__(self, z: int, n_pivots: int, depth: int):
        self.z = z
        self.children: dict[int, Node] = {}
        self.leaf: Leaf | None = None
        self.hr: np.ndarray | None = _empty_hr(n_pivots) if n_pivots else None
        self.refpoint: np.ndarray | None = None
        self.rect: np.ndarray | None = None
        self.depth = depth
        self.max_suffix = 0
        # frozen traversal structure (filled by RPTrie._finalize)
        self.child_nodes: list[Node] | None = None
        self.chain_refpts: np.ndarray | None = None
        self.chain_rects: np.ndarray | None = None
        self.chain_end: "Node | None" = None


def _empty_hr(n_pivots: int) -> np.ndarray:
    hr = np.empty((n_pivots, 2), dtype=float)
    hr[:, 0] = np.inf
    hr[:, 1] = -np.inf
    return hr


def _update_hr(hr: np.ndarray | None, pd: np.ndarray | None) -> None:
    if hr is None or pd is None:
        return
    np.minimum(hr[:, 0], pd, out=hr[:, 0])
    np.maximum(hr[:, 1], pd, out=hr[:, 1])


def dedup_first_occurrence(zs: np.ndarray) -> np.ndarray:
    """Distinct z-values in first-occurrence order (§III-C step 1)."""
    _, idx = np.unique(zs, return_index=True)
    return zs[np.sort(idx)]


class RPTrie:
    """A per-partition reference point trie.

    Parameters
    ----------
    grid : the z-order grid (shared across partitions; built from global
        dataset bounds so reference trajectories agree everywhere).
    fn : exact distance kernel of the active measure (used for pivot
        distances and D_max).
    pivots : global pivot trajectories (empty for non-metrics).
    """

    def __init__(
        self,
        grid: Grid,
        fn: Callable,
        pivots: Sequence[np.ndarray] = (),
        *,
        collapse_ref_for_dists: bool = False,
        need_dmax: bool = True,
    ):
        self.grid = grid
        self.fn = fn
        self.pivots = list(pivots)
        self.n_pivots = len(self.pivots)
        self.root = Node(-1, self.n_pivots, depth=0)
        self.pivot_slack = 0.0  # max leaf D_max — slack for the HR bound
        self.n_trajs = 0
        # HR/D_max distances may run on the consecutive-duplicate-collapsed
        # reference trajectory — valid for measures invariant to collapsing
        # (Hausdorff: set semantics; discrete Frechet: couplings may repeat
        # points) and a large build speed-up since the DP cost is O(L²).
        self.collapse_ref_for_dists = collapse_ref_for_dists
        # D_max feeds LB_t (Hausdorff/Frechet) and the pivot slack
        # (metrics); measures that use neither (DTW/EDR/LCSS) skip it.
        self.need_dmax = need_dmax

    # ------------------------------------------------------------------
    def build(self, trajs: Sequence[tuple[int, np.ndarray]], mode: str = "basic") -> None:
        """Insert trajectories ``(tid, (n,2) points)``; then freeze."""
        if mode not in ("basic", "dedup", "opt"):
            raise ValueError(f"unknown trie mode {mode!r}")
        items = []
        for tid, pts in trajs:
            zs = ref_trajectory(self.grid, pts)
            if mode != "basic":
                zs = dedup_first_occurrence(zs)
            zd = zs
            if self.collapse_ref_for_dists and len(zs) > 1:
                zd = zs[np.concatenate([[True], zs[1:] != zs[:-1]])]
            rp = ref_points(self.grid, zd)
            pd = (
                np.array([self.fn(p, rp) for p in self.pivots], dtype=float)
                if self.n_pivots
                else None
            )
            dmax = float(self.fn(pts, rp)) if self.need_dmax else 0.0
            items.append((tid, zs, pd, dmax))
            self.pivot_slack = max(self.pivot_slack, dmax)
        self.n_trajs = len(items)
        if mode == "opt":
            sets = [(tid, set(zs.tolist()), pd, dmax) for tid, zs, pd, dmax in items]
            for _, _, pd, _ in sets:
                _update_hr(self.root.hr, pd)
            self._build_greedy(self.root, sets)
        else:
            for tid, zs, pd, dmax in items:
                self._insert_path(tid, zs, pd, dmax)
        self._finalize(self.root)

    # -- sequential insertion (basic / dedup) ---------------------------
    def _insert_path(self, tid: int, zs: np.ndarray, pd, dmax: float) -> None:
        node = self.root
        _update_hr(node.hr, pd)
        for z in zs.tolist():
            child = node.children.get(z)
            if child is None:
                child = self._new_node(z, node.depth + 1)
                node.children[z] = child
            _update_hr(child.hr, pd)
            node = child
        self._attach_leaf(node, tid, pd, dmax)

    def _new_node(self, z: int, depth: int) -> Node:
        n = Node(z, self.n_pivots, depth)
        n.refpoint = self.grid.refpoints_of_z(np.array([z]))[0]
        n.rect = self.grid.cell_rects_of_z(np.array([z]))[0]
        return n

    def _attach_leaf(self, node: Node, tid: int, pd, dmax: float) -> None:
        if node.leaf is None:
            node.leaf = Leaf(self.n_pivots)
        node.leaf.tids.append(tid)
        node.leaf.dmax = max(node.leaf.dmax, dmax)
        _update_hr(node.leaf.hr, pd)

    # -- greedy hitting-set construction (Appendix B) -------------------
    def _build_greedy(self, parent: Node, items: list) -> None:
        """Recursively partition ``items`` (tid, remaining z-set, pd, dmax).

        Implements the appendix bookkeeping: count C(Z) once, pick the
        most frequent z, split off Z^z (counting C(Z^z) for the recursive
        call), and obtain the remaining counts as C(Z) − C(Z^z).
        """
        remaining = []
        for it in items:
            if it[1]:
                remaining.append(it)
            else:  # complete path consumed → $-leaf at the parent
                self._attach_leaf(parent, it[0], it[2], it[3])
        counts = Counter()
        for _, zset, _, _ in remaining:
            counts.update(zset)
        while remaining:
            z1, _ = max(counts.items(), key=lambda kv: (kv[1], -kv[0]))
            group, rest = [], []
            sub_counts = Counter()
            for it in remaining:
                if z1 in it[1]:
                    sub_counts.update(it[1])
                    it[1].discard(z1)
                    group.append(it)
                else:
                    rest.append(it)
            counts.subtract(sub_counts)  # C(Z) ← C(Z) − C(Z^z1)
            del counts[z1]
            child = self._new_node(z1, parent.depth + 1)
            parent.children[z1] = child
            for it in group:
                _update_hr(child.hr, it[2])
            self._build_greedy(child, group)
            remaining = rest

    # -- freeze: child lists, max_suffix, and compressed chains ---------
    def _finalize(self, root: Node) -> None:
        """Iterative post-order pass (trie depth can reach trajectory
        length ~1000, beyond Python's default recursion limit)."""
        # 1) child lists + post-order for max_suffix
        order: list[Node] = []
        stack = [root]
        while stack:
            n = stack.pop()
            n.child_nodes = list(n.children.values())
            order.append(n)
            stack.extend(n.child_nodes)
        for n in reversed(order):
            n.max_suffix = (
                1 + max(c.max_suffix for c in n.child_nodes)
                if n.child_nodes
                else 0
            )
        # 2) path compression: each child of a *reachable* node starts a
        # chain running through single-child, leaf-free nodes; the search
        # jumps straight to chain_end. Only branch/leaf nodes (and the
        # root) are reachable, so every chain is built exactly once.
        frontier = [root]
        while frontier:
            n = frontier.pop()
            for child in n.child_nodes:
                chain = [child]
                cur = child
                while len(cur.child_nodes) == 1 and cur.leaf is None:
                    cur = cur.child_nodes[0]
                    chain.append(cur)
                child.chain_refpts = np.stack([c.refpoint for c in chain])
                child.chain_rects = np.stack([c.rect for c in chain])
                child.chain_end = cur
                frontier.append(cur)

    # -- compact serialization -----------------------------------------
    # Pickling the linked Node graph costs ~700 bytes/node and, because
    # PySpark caches RDD elements serialized, both the bytes *and* the
    # rebuild would be paid per query. The trie therefore pickles as its
    # path-compressed edge list: one record per chain (flat z-value
    # array + end-node metadata + HR), which is both small (~60 B/node)
    # and cheap to restore (~#branch+#leaf Node objects, not #nodes).
    # The restored trie is a *search-only view*: chain-interior nodes are
    # not materialized, so node_count()/iter_nodes()/succinct encoding
    # are only meaningful on the originally built trie (where the IS
    # metric is computed, before any serialization).

    def __getstate__(self):
        chain_zs: list[np.ndarray] = []
        parents: list[int] = []
        depths: list[int] = []
        suffixes: list[int] = []
        hrs: list[np.ndarray] = []
        leaves: list[tuple] = []
        edge_of: dict[int, int] = {id(self.root): -1}
        frontier = [self.root]
        while frontier:
            node = frontier.pop()
            for child in node.child_nodes:
                end = child.chain_end
                e = len(parents)
                edge_of[id(end)] = e
                parents.append(edge_of[id(node)])
                chain_zs.append(
                    self.grid.z_of_points(
                        child.chain_refpts[:, 0], child.chain_refpts[:, 1]
                    )
                )
                depths.append(end.depth)
                suffixes.append(end.max_suffix)
                if self.n_pivots:
                    hrs.append(child.hr)  # == end.hr along a chain
                if end.leaf is not None:
                    leaves.append(
                        (e, end.leaf.tids, end.leaf.dmax, end.leaf.hr)
                    )
                frontier.append(end)
        lens = np.array([len(c) for c in chain_zs], dtype=np.int32)
        return {
            "grid": self.grid,
            "fn": self.fn,
            "pivots": self.pivots,
            "n_pivots": self.n_pivots,
            "pivot_slack": self.pivot_slack,
            "n_trajs": self.n_trajs,
            "collapse_ref_for_dists": self.collapse_ref_for_dists,
            "need_dmax": self.need_dmax,
            "zs_flat": (
                np.concatenate(chain_zs) if chain_zs else np.zeros(0, np.int64)
            ),
            "lens": lens,
            "parents": np.asarray(parents, dtype=np.int32),
            "depths": np.asarray(depths, dtype=np.int32),
            "suffixes": np.asarray(suffixes, dtype=np.int32),
            "hrs": np.stack(hrs).astype(np.float32) if hrs else None,
            "root_hr": self.root.hr,
            "leaves": leaves,
        }

    def __setstate__(self, st):
        for k in (
            "grid", "fn", "pivots", "n_pivots", "pivot_slack", "n_trajs",
            "collapse_ref_for_dists", "need_dmax",
        ):
            setattr(self, k, st[k])
        self.root = Node(-1, 0, depth=0)
        self.root.hr = st["root_hr"]
        self.root.child_nodes = []
        zs_flat = st["zs_flat"]
        refpts = self.grid.refpoints_of_z(zs_flat)
        rects = self.grid.cell_rects_of_z(zs_flat)
        offs = np.concatenate([[0], np.cumsum(st["lens"])])
        hrs64 = None
        if st["hrs"] is not None:
            # widen the float32-rounded (min,max) by one ulp so the pivot
            # bound stays admissible after the round trip
            hrs64 = st["hrs"].astype(np.float64)
            hrs64[..., 0] = np.nextafter(st["hrs"][..., 0], -np.inf)
            hrs64[..., 1] = np.nextafter(st["hrs"][..., 1], np.inf)
        nodes: list[Node] = []
        parents = st["parents"]
        for e in range(len(parents)):
            n = Node.__new__(Node)
            lo, hi = offs[e], offs[e + 1]
            n.z = int(zs_flat[hi - 1])
            n.children = {}
            n.leaf = None
            n.hr = hrs64[e] if hrs64 is not None else None
            n.refpoint = refpts[hi - 1]
            n.rect = rects[hi - 1]
            n.depth = int(st["depths"][e])
            n.max_suffix = int(st["suffixes"][e])
            n.child_nodes = []
            n.chain_refpts = refpts[lo:hi]
            n.chain_rects = rects[lo:hi]
            n.chain_end = n  # merged head/end: a single search-view node
            nodes.append(n)
            parent = self.root if parents[e] < 0 else nodes[parents[e]]
            parent.children[int(zs_flat[lo])] = n
            parent.child_nodes.append(n)
        for e, tids, dmax, hr in st["leaves"]:
            leaf = Leaf.__new__(Leaf)
            leaf.tids = tids
            leaf.dmax = dmax
            leaf.hr = hr
            nodes[e].leaf = leaf

    # -- stats ---------------------------------------------------------
    def node_count(self) -> int:
        """Number of trie nodes, excluding the root (Fig. 7 metric)."""
        count = 0
        stack = [self.root]
        while stack:
            n = stack.pop()
            count += len(n.children)
            stack.extend(n.child_nodes or n.children.values())
        return count

    def iter_nodes(self):
        stack = [self.root]
        while stack:
            n = stack.pop()
            yield n
            stack.extend(n.children.values())

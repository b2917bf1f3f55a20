"""Octree over (x, y, t) — the spatio-temporal index RL4QDTS traverses.

The tree recursively splits the bounding cube of the database into 8
octants (2 spatial bits, 1 temporal bit) down to ``max_depth`` (the
paper's ``E``) or until a node holds few points. Each node carries the
two static distribution features the Agent-Cube state (Eq. 4) is built
from: ``m`` (number of distinct trajectories whose points fall in the
cube — ``M_B``) and ``q`` (number of workload queries intersecting the
cube — ``Q_B``), plus a dynamic ``remaining`` counter of not-yet-selected
points used to mask actions toward empty cubes.
"""
from __future__ import annotations

import numpy as np


class OctreeNode:
    """One cube. ``idx`` holds global point indices inside the cube."""

    __slots__ = ("depth", "lo", "hi", "idx", "children", "m", "q", "remaining")

    def __init__(self, depth: int, lo: np.ndarray, hi: np.ndarray, idx: np.ndarray):
        self.depth = depth
        self.lo = lo
        self.hi = hi
        self.idx = idx
        self.children: list[OctreeNode | None] | None = None  # None => leaf
        self.m = 0
        self.q = 0
        self.remaining = len(idx)

    @property
    def is_leaf(self) -> bool:
        return self.children is None


class Octree:
    """Index over one trajectory database.

    Parameters
    ----------
    xyz : (N, 3) float array of (x, y, t)
    traj_ids : (N,) int array
    max_depth : the paper's ``E`` — traversal never goes deeper
    leaf_size : stop splitting below this many points
    """

    def __init__(
        self,
        xyz: np.ndarray,
        traj_ids: np.ndarray,
        *,
        max_depth: int = 6,
        leaf_size: int = 16,
    ):
        self.xyz = np.asarray(xyz, dtype=np.float64)
        self.traj_ids = np.asarray(traj_ids, dtype=np.int64)
        self.max_depth = max_depth
        self.leaf_size = leaf_size
        lo = self.xyz.min(axis=0)
        hi = self.xyz.max(axis=0)
        # Degenerate dims (all-equal coordinate) get a token width so the
        # midpoint split is well defined.
        hi = np.where(hi - lo < 1e-9, lo + 1.0, hi)
        self.root = OctreeNode(1, lo, hi, np.arange(len(self.xyz), dtype=np.int64))
        self._build(self.root)

    # -- construction ------------------------------------------------------

    def _build(self, node: OctreeNode) -> None:
        node.m = len(np.unique(self.traj_ids[node.idx]))
        if node.depth >= self.max_depth or len(node.idx) <= self.leaf_size:
            return
        mid = (node.lo + node.hi) / 2.0
        pts = self.xyz[node.idx]
        octant = (
            (pts[:, 0] >= mid[0]).astype(np.int8)
            + 2 * (pts[:, 1] >= mid[1]).astype(np.int8)
            + 4 * (pts[:, 2] >= mid[2]).astype(np.int8)
        )
        node.children = []
        for k in range(8):
            sub = node.idx[octant == k]
            if len(sub) == 0:
                node.children.append(None)
                continue
            lo = node.lo.copy()
            hi = mid.copy()
            for d in range(3):
                if (k >> d) & 1:
                    lo[d], hi[d] = mid[d], node.hi[d]
            child = OctreeNode(node.depth + 1, lo, hi, sub)
            node.children.append(child)
            self._build(child)

    def assign_queries(self, centers: np.ndarray) -> None:
        """Set ``q`` = number of query *centers* falling inside each node.

        ``centers`` is (Q, 3): the (x, y, t) locations of a (dense)
        sample from the query distribution — RL4QDTS samples start cubes
        and builds Agent-Cube states from how queries distribute over
        cubes, so per-node counts of distribution samples are the
        natural octree-side representation (DESIGN.md §4).
        """
        centers = np.asarray(centers, dtype=np.float64)

        def rec(node: OctreeNode, active: np.ndarray) -> None:
            if len(active) == 0:
                node.q = 0
            else:
                c = centers[active]
                inside = (
                    (c[:, 0] >= node.lo[0]) & (c[:, 0] <= node.hi[0])
                    & (c[:, 1] >= node.lo[1]) & (c[:, 1] <= node.hi[1])
                    & (c[:, 2] >= node.lo[2]) & (c[:, 2] <= node.hi[2])
                )
                active = active[inside]
                node.q = len(active)
            if node.children:
                for ch in node.children:
                    if ch is not None:
                        rec(ch, active)

        rec(self.root, np.arange(len(centers)))

    # -- traversal helpers -------------------------------------------------

    def nodes_at_level(self, level: int) -> list[OctreeNode]:
        """Nodes at ``depth == level``, plus leaves shallower than that
        (a shallow leaf is its own 'level-S cube' — there is nothing
        below it to sample)."""
        out: list[OctreeNode] = []

        def rec(node: OctreeNode) -> None:
            if node.depth == level or (node.is_leaf and node.depth < level):
                out.append(node)
                return
            if node.children:
                for c in node.children:
                    if c is not None:
                        rec(c)

        rec(self.root)
        return out

    def mark_selected(self, point_index: int) -> None:
        """Decrement ``remaining`` along the root-to-leaf path containing
        the point — O(depth)."""
        p = self.xyz[point_index]
        node = self.root
        while node is not None:
            node.remaining -= 1
            if node.is_leaf:
                return
            mid = (node.lo + node.hi) / 2.0
            k = int(p[0] >= mid[0]) + 2 * int(p[1] >= mid[1]) + 4 * int(p[2] >= mid[2])
            node = node.children[k]

    def candidates(self, node: OctreeNode, selected: np.ndarray) -> np.ndarray:
        """Global indices of the node's not-yet-selected points."""
        idx = node.idx
        return idx[~selected[idx]]

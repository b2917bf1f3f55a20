"""Shared runtime for the RL4QDTS MDPs (paper Section IV-A/B).

``QDTSRuntime`` owns everything both agents observe and mutate while
simplifying ONE trajectory database:

- the flat point arrays and per-trajectory slices;
- the ``selected`` mask (which points are in D') and per-trajectory
  sorted lists of selected sequence positions (for anchor lookup);
- the octree with static per-node features ``M_B`` (trajectories) and
  ``Q_B`` (workload queries) and the dynamic ``remaining`` counters;
- Agent-Cube state vectors (Eq. 4: the 8 children's M- and Q-ratios)
  with action masks (children without unselected points are invalid);
- Agent-Point state vectors (Eq. 8: the top-K ``(v_s, v_t)`` pairs,
  one candidate point per trajectory, ranked by ``v_s``) where ``v_s``
  is the SED of the point w.r.t. its *current anchor segment in D'*
  and ``v_t`` the time offset to its spatially closest anchor point.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.octree import Octree, OctreeNode

_EPS = 1e-12

CUBE_STATE_DIM = 16  # 8 children × (M ratio, Q ratio)
CUBE_ACTIONS = 9  # 8 descend + 1 stop


def point_state_dim(k: int) -> int:
    return 2 * k  # K × (v_s, v_t)


class QDTSRuntime:
    """State of one in-progress database simplification."""

    def __init__(
        self,
        db: pd.DataFrame,
        query_centers: np.ndarray,
        *,
        max_depth: int = 7,
        leaf_size: int = 16,
        k: int = 2,
    ):
        db = db.sort_values(["traj_id", "seq"]).reset_index(drop=True)
        self.db = db
        self.x = db["x"].to_numpy(dtype=np.float64)
        self.y = db["y"].to_numpy(dtype=np.float64)
        self.t = db["t"].to_numpy(dtype=np.float64)
        self.seq = db["seq"].to_numpy(dtype=np.int64)
        self.traj = db["traj_id"].to_numpy(dtype=np.int64)
        self.n = len(db)
        self.k = k
        # Per-trajectory contiguous slices; tids ordered as in the array.
        change = np.nonzero(np.diff(self.traj))[0] + 1
        starts = np.concatenate([[0], change])
        ends = np.concatenate([change, [self.n]])
        self.tids = self.traj[starts]
        self.slices = {int(t): (int(s), int(e)) for t, s, e in zip(self.tids, starts, ends)}
        self._row_of_traj = {int(t): i for i, t in enumerate(self.tids)}
        # Spatial index over (x, y, t).
        self.octree = Octree(
            np.column_stack([self.x, self.y, self.t]),
            self.traj,
            max_depth=max_depth,
            leaf_size=leaf_size,
        )
        self.octree.assign_queries(query_centers)
        self.query_centers = query_centers
        # D' bookkeeping. ``anchor_lo``/``anchor_hi`` give, for every
        # *unselected* row, the global rows of its current anchor-segment
        # endpoints in D'; inserting a row only retargets the rows in its
        # former anchor interval, so updates are O(interval).
        self.selected = np.zeros(self.n, dtype=bool)
        self.anchor_lo = np.zeros(self.n, dtype=np.int64)
        self.anchor_hi = np.zeros(self.n, dtype=np.int64)
        self._n_selected = 0
        for tid, (s, e) in self.slices.items():
            self.anchor_lo[s:e] = s
            self.anchor_hi[s:e] = e - 1
            for row in {s, e - 1}:
                self.selected[row] = True
                self._n_selected += 1
                self.octree.mark_selected(row)

    # -- selection ---------------------------------------------------------

    @property
    def n_selected(self) -> int:
        return self._n_selected

    def insert(self, row: int) -> None:
        """Insert original point (global row) into D'."""
        if self.selected[row]:
            raise ValueError(f"row {row} already selected")
        a, b = int(self.anchor_lo[row]), int(self.anchor_hi[row])
        self.anchor_hi[a + 1 : row] = row
        self.anchor_lo[row + 1 : b] = row
        self.selected[row] = True
        self._n_selected += 1
        self.octree.mark_selected(row)

    def simplified_db(self) -> pd.DataFrame:
        return self.db[self.selected].reset_index(drop=True)

    # -- Agent-Point values (Eq. 6) ---------------------------------------

    def _values_for_rows(self, rows: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """(v_s, v_t) for candidate rows (vectorized); anchors come from
        the maintained ``anchor_lo``/``anchor_hi`` arrays."""
        a = self.anchor_lo[rows]
        b = self.anchor_hi[rows]
        # v_s: SED — distance to the time-synchronized anchor point.
        dt = self.t[b] - self.t[a]
        safe_dt = np.where(np.abs(dt) > _EPS, dt, 1.0)
        u = np.where(np.abs(dt) > _EPS, (self.t[rows] - self.t[a]) / safe_dt, 0.5)
        sx = self.x[a] + u * (self.x[b] - self.x[a])
        sy = self.y[a] + u * (self.y[b] - self.y[a])
        vs = np.hypot(self.x[rows] - sx, self.y[rows] - sy)
        # v_t: |t_p − t(closest anchor-segment point in space)|.
        vx, vy = self.x[b] - self.x[a], self.y[b] - self.y[a]
        den = vx * vx + vy * vy
        safe_den = np.where(den > _EPS, den, 1.0)
        up = np.where(
            den > _EPS,
            ((self.x[rows] - self.x[a]) * vx + (self.y[rows] - self.y[a]) * vy) / safe_den,
            0.0,
        )
        up = np.clip(up, 0.0, 1.0)
        vt = np.abs(self.t[rows] - (self.t[a] + up * dt))
        return vs, vt

    def point_state(self, node: OctreeNode) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """Agent-Point state (Eq. 8) for cube ``node``.

        Returns (state vector of shape 2K, action mask of shape K,
        candidate rows array of shape ≤K — ``rows[a]`` is the point
        action ``a`` inserts)."""
        cand = self.octree.candidates(node, self.selected)
        k = self.k
        state = np.zeros(2 * k)
        mask = np.zeros(k, dtype=bool)
        if len(cand) == 0:
            return state, mask, np.empty(0, dtype=np.int64)
        vs, vt = self._values_for_rows(cand)
        # Best (max v_s) candidate per trajectory (Eq. 7).
        order = np.lexsort((-vs, self.traj[cand]))
        cand, vs, vt = cand[order], vs[order], vt[order]
        first = np.ones(len(cand), dtype=bool)
        first[1:] = self.traj[cand][1:] != self.traj[cand][:-1]
        cand, vs, vt = cand[first], vs[first], vt[first]
        # Top-K trajectories by v_s (descending).
        top = np.argsort(-vs)[:k]
        cand, vs, vt = cand[top], vs[top], vt[top]
        # Scale-normalize (the paper handles scale with batch norm; the
        # state itself must be scale-free across datasets).
        vs_n = vs / vs.max() if vs.max() > 0 else vs
        vt_n = vt / vt.max() if vt.max() > 0 else vt
        m = len(cand)
        state[0 : 2 * m : 2] = vs_n
        state[1 : 2 * m : 2] = vt_n
        mask[:m] = True
        return state, mask, cand

    # -- Agent-Cube state (Eq. 4) -----------------------------------------

    def cube_state(self, node: OctreeNode) -> tuple[np.ndarray, np.ndarray]:
        """(state of shape 16, action mask of shape 9) at ``node``.

        Descend actions (0..7) are valid for children that exist and
        still hold unselected points; the stop action (8) is valid when
        the node itself holds unselected points. At a leaf only stop is
        valid."""
        state = np.zeros(CUBE_STATE_DIM)
        mask = np.zeros(CUBE_ACTIONS, dtype=bool)
        mask[8] = node.remaining > 0
        if node.children:
            for j, c in enumerate(node.children):
                if c is None:
                    continue
                state[2 * j] = c.m / max(node.m, 1)
                state[2 * j + 1] = c.q / max(node.q, 1)
                mask[j] = c.remaining > 0
        return state, mask

    # -- start-level sampling (hyper-parameter S) --------------------------

    def start_nodes(self, level: int, *, by: str = "query") -> tuple[list[OctreeNode], np.ndarray]:
        """Level-S nodes with unselected points and their sampling
        weights.

        ``by="query"`` follows the query distribution (+1 smoothing so
        query-free nodes stay reachable) — the full RL4QDTS start
        sampling. ``by="data"`` follows the data distribution (remaining
        point counts) — what the paper's "w/o Agent-Cube" ablation
        reduces to (Section V-B(3))."""
        nodes = [nd for nd in self.octree.nodes_at_level(level) if nd.remaining > 0]
        if by == "query":
            w = np.array([nd.q + 0.1 for nd in nodes])
        elif by == "data":
            w = np.array([float(nd.remaining) for nd in nodes])
        else:
            raise ValueError(f"unknown sampling {by!r}")
        return nodes, w / w.sum() if len(nodes) else w

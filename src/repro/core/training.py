"""Policy learning for RL4QDTS (paper Section IV-C and V-A).

Training runs episodes over small sampled trajectory databases. During
an episode the two agents simplify the database exactly as at test
time (ε-greedy instead of greedy); every Δ insertions the synthetic
range-query workload is evaluated and the shared reward (Eq. 10)

    R = diff(Q(D), Q(D')) − diff(Q(D), Q(D''))     diff = 1 − mean F1

is assigned to every Agent-Cube and Agent-Point transition in the
window. Query evaluation is *incremental*: a per-point × per-query
membership matrix is precomputed once, and inserting a point updates
only the per-query (|R_s|, |R_o ∩ R_s|) counters of the queries whose
box contains it — so rewards cost O(queries hit), not O(N·Q).

``RewardTracker`` is also what makes Eq. 11's telescoping hold exactly
in this implementation: the cumulative reward of an episode equals
diff(initial) − diff(final), which tests assert.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.dqn import DQN
from repro.core.mdp import CUBE_ACTIONS, CUBE_STATE_DIM, QDTSRuntime, point_state_dim
from repro.core.rl4qdts import RL4QDTSConfig, choose_point, traverse_cube
from repro.workloads.distributions import query_centers, range_query_workload


class RewardTracker:
    """Incremental diff(Q(D), Q(D')) for a fixed range-query workload."""

    def __init__(self, rt: QDTSRuntime, boxes: np.ndarray):
        x, y, t = rt.x, rt.y, rt.t
        b = np.asarray(boxes, dtype=np.float64)
        # (N, Q) membership — training databases are small by design.
        self.member = (
            (x[:, None] >= b[None, :, 0]) & (x[:, None] <= b[None, :, 1])
            & (y[:, None] >= b[None, :, 2]) & (y[:, None] <= b[None, :, 3])
            & (t[:, None] >= b[None, :, 4]) & (t[:, None] <= b[None, :, 5])
        )
        self.traj = rt.traj
        self.nq = len(b)
        # Ground truth per query: trajectory sets on the full D.
        self.r_o = [set(np.unique(self.traj[self.member[:, q]]).tolist()) for q in range(self.nq)]
        self.n_o = np.array([len(s) for s in self.r_o])
        # Current D' result sets.
        self.r_s: list[set] = [set() for _ in range(self.nq)]
        self.inter = np.zeros(self.nq)
        for row in np.nonzero(rt.selected)[0]:
            self.add_point(int(row))

    def add_point(self, row: int) -> None:
        tid = int(self.traj[row])
        for q in np.nonzero(self.member[row])[0]:
            if tid not in self.r_s[q]:
                self.r_s[q].add(tid)
                if tid in self.r_o[q]:
                    self.inter[int(q)] += 1

    def diff(self) -> float:
        """1 − mean per-query F1 (empty-vs-empty scores F1 = 1)."""
        n_s = np.array([len(s) for s in self.r_s], dtype=np.float64)
        f1 = np.ones(self.nq)
        nonempty = (self.n_o + n_s) > 0
        with np.errstate(divide="ignore", invalid="ignore"):
            p = np.where(n_s > 0, self.inter / np.where(n_s > 0, n_s, 1), 0.0)
            r = np.where(self.n_o > 0, self.inter / np.where(self.n_o > 0, self.n_o, 1), 0.0)
            f = np.where(p + r > 0, 2 * p * r / np.where(p + r > 0, p + r, 1), 0.0)
        f1[nonempty] = f[nonempty]
        return float(1.0 - f1.mean())


class _AgentBuffer:
    """Chronological transition chaining for one agent.

    The paper shares the window reward across *every* transition taken
    while traversing from s_i to s_{i+Δ} (Section IV-B). Transitions
    accumulate per window; ``assign_reward`` stores each with the
    shared reward and its successor state, carrying the window's last
    transition forward so it chains into the next window's first state."""

    def __init__(self, agent: DQN):
        self.agent = agent
        self.window: list[tuple] = []  # (s, a, mask, reward_bearing)
        self.carry: tuple | None = None  # (s, a, r) awaiting next state

    def observe(self, s, a, mask, *, reward_bearing: bool = True) -> None:
        """Record a transition. ``reward_bearing=False`` marks an
        intermediate traversal step that receives reward 0 instead of
        the shared window reward: attaching the (mostly positive) shared
        reward to *every* descend step makes Q-values grow with
        traversal length, biasing Agent-Cube toward needless descents —
        the instability the paper counters by capping E. Reward-0
        descends still bootstrap γ·max Q(next), preserving the
        telescoped objective (documented deviation, DESIGN.md §4)."""
        if self.carry is not None:
            cs, ca, cr = self.carry
            self.agent.remember(cs, ca, cr, s, False, mask)
            self.agent.learn()
            self.carry = None
        self.window.append((s, a, mask, reward_bearing))

    def assign_reward(self, r: float) -> None:
        for (s, a, _, rb), (s2, _, m2, _) in zip(self.window[:-1], self.window[1:]):
            self.agent.remember(s, a, r if rb else 0.0, s2, False, m2)
            self.agent.learn()
        if self.window:
            s, a, _, rb = self.window[-1]
            self.carry = (s, a, r if rb else 0.0)
        self.window = []

    def finish(self, r: float) -> None:
        self.assign_reward(r)
        if self.carry is not None:
            s, a, rr = self.carry
            self.agent.remember(s, a, rr, None, True)
            self.agent.learn()
            self.carry = None


def run_episode(
    db: pd.DataFrame,
    ratio: float,
    cube_agent: DQN,
    point_agent: DQN,
    *,
    config: RL4QDTSConfig,
    delta: int = 50,
    rng: np.random.Generator,
) -> dict:
    """One training episode on one database; returns episode stats."""
    boxes = range_query_workload(
        db,
        n_queries=config.n_queries,
        distribution=config.distribution,
        spatial=config.query_spatial,
        duration=config.query_duration,
        seed=int(rng.integers(1 << 31)),
    )
    centers = query_centers(
        db,
        n=config.n_query_centers,
        distribution=config.distribution,
        seed=int(rng.integers(1 << 31)),
    )
    rt = QDTSRuntime(db, centers, max_depth=config.max_depth, leaf_size=config.leaf_size, k=config.k)
    tracker = RewardTracker(rt, boxes)
    budget = max(rt.n_selected, int(round(ratio * rt.n)))
    cbuf, pbuf = _AgentBuffer(cube_agent), _AgentBuffer(point_agent)
    diff0 = tracker.diff()
    window_diff = diff0
    window_count = 0
    while rt.n_selected < budget:
        nodes, w = rt.start_nodes(config.start_level)
        if not nodes:
            break
        start = nodes[rng.choice(len(nodes), p=w)]
        crec: list = []
        cube = traverse_cube(rt, start, cube_agent, max_depth=config.max_depth, record=crec, greedy=False)
        prec: list = []
        row = choose_point(rt, cube, point_agent, record=prec, greedy=False)
        if row is None:
            continue
        rt.insert(row)
        tracker.add_point(row)
        for i, (s, a, m) in enumerate(crec):
            # Only the traversal's final (stop) action carries the shared
            # reward; see _AgentBuffer.observe.
            cbuf.observe(s, a, m, reward_bearing=(i == len(crec) - 1))
        for s, a, m in prec:
            pbuf.observe(s, a, m)
        window_count += 1
        if window_count >= delta:
            new_diff = tracker.diff()
            reward = window_diff - new_diff  # Eq. 10
            cbuf.assign_reward(reward)
            pbuf.assign_reward(reward)
            window_diff = new_diff
            window_count = 0
    final_diff = tracker.diff()
    tail_reward = window_diff - final_diff
    cbuf.finish(tail_reward)
    pbuf.finish(tail_reward)
    return {"initial_diff": diff0, "final_diff": final_diff, "inserted": rt.n_selected}


def train_rl4qdts(
    databases: list[pd.DataFrame],
    *,
    ratio: float = 0.05,
    config: RL4QDTSConfig | None = None,
    episodes_per_db: int = 5,
    delta: int = 50,
    seed: int = 0,
    validation_db: pd.DataFrame | None = None,
) -> tuple[DQN, DQN, list[dict]]:
    """Train Agent-Cube + Agent-Point over the given sample databases
    (paper: 12 databases × 5 episodes; "the best model is chosen during
    training"). Returns both agents and per-episode stats.

    Model selection: if ``validation_db`` is given, after each episode
    the current policies run *greedily* on it and the snapshot with the
    lowest validation query-result difference wins — exploration noise
    in training episodes makes their final_diff a poor selector.
    Without a validation database, the best training final_diff is used.
    """
    from repro.core.rl4qdts import rl4qdts_simplify  # cycle-free at call time

    cfg = config or RL4QDTSConfig()
    rng = np.random.default_rng(seed)
    cube_agent = DQN(CUBE_STATE_DIM, CUBE_ACTIONS, seed=seed)
    point_agent = DQN(point_state_dim(cfg.k), cfg.k, seed=seed + 1)
    val_boxes = val_res = None
    if validation_db is not None:
        val_boxes = range_query_workload(
            validation_db,
            n_queries=cfg.n_queries,
            distribution=cfg.distribution,
            spatial=cfg.query_spatial,
            duration=cfg.query_duration,
            seed=seed + 7919,
        )
        val_res = _range_results(validation_db, val_boxes)
    stats = []
    best = np.inf
    best_snapshots: tuple[bytes, bytes] | None = None
    for ep in range(episodes_per_db):
        for di, db in enumerate(databases):
            st = run_episode(db, ratio, cube_agent, point_agent, config=cfg, delta=delta, rng=rng)
            st.update(episode=ep, database=di)
            if validation_db is not None:
                dprime = rl4qdts_simplify(
                    validation_db,
                    ratio,
                    cube_policy=cube_agent,
                    point_policy=point_agent,
                    config=cfg,
                    rng=np.random.default_rng(seed + 31 * ep + di),
                )
                score = 1.0 - _mean_f1(val_res, _range_results(dprime, val_boxes))
                st["validation_diff"] = score
            else:
                score = st["final_diff"]
            stats.append(st)
            if score < best:
                best = score
                best_snapshots = (cube_agent.to_bytes(), point_agent.to_bytes())
    if best_snapshots is not None:
        cube_agent = DQN.from_bytes(best_snapshots[0])
        point_agent = DQN.from_bytes(best_snapshots[1])
    return cube_agent, point_agent, stats


def _range_results(db: pd.DataFrame, boxes: np.ndarray) -> dict:
    from repro.queries.range_query import range_query_numpy

    return range_query_numpy(db, boxes)


def _mean_f1(a: dict, b: dict) -> float:
    from repro.queries.measures import mean_f1

    return mean_f1(a, b)

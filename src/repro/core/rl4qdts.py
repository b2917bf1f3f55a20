"""RL4QDTS — Algorithms 1–3 of the paper, plus the Table-II ablations.

:func:`rl4qdts_simplify` simplifies one pandas trajectory database with
trained (or absent, for ablations) Agent-Cube / Agent-Point policies:

1. build the octree and seed D' with every trajectory's endpoints
   (Algorithm 1, lines 2–5);
2. until the budget is exhausted: sample a start cube at level ``S``
   following the query distribution, let Agent-Cube traverse down to at
   most depth ``E`` (Algorithm 2), then let Agent-Point insert one
   point from the chosen cube (Algorithm 3).

Ablations (paper Table II):
- ``use_agent_cube=False`` — the sampled start cube is handed directly
  to Agent-Point (the paper emulates this with S=9, E=10: no traversal);
- ``use_agent_point=False`` — insert the maximum-value (max ``v_s``)
  point instead of sampling the policy.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.dqn import DQN
from repro.core.mdp import QDTSRuntime
from repro.core.octree import OctreeNode
from repro.workloads.distributions import query_centers


@dataclass
class RL4QDTSConfig:
    """Hyper-parameters (paper values S=9, E=12, K=2 for million-point
    octrees; defaults here fit the container-scale trees — DESIGN.md §4)."""

    start_level: int = 5  # S
    max_depth: int = 7  # E (also the octree build depth)
    k: int = 2  # K — Agent-Point state size
    leaf_size: int = 16
    n_queries: int = 100
    # Dense sample of the query distribution for the octree's Q_B
    # features and start-cube sampling (DESIGN.md §4): the algorithm
    # conditions on the *distribution*, not on a particular 100-query
    # workload realization. Denser = less Monte-Carlo noise in the cube
    # weights (measurably better range F1); cost is one O(n) pass.
    n_query_centers: int = 10_000
    distribution: str = "data"
    # Paper test queries: 2 km boxes, 7-day windows over multi-month
    # datasets. Our synthetic span is 7 days total, so equivalently
    # *selective* queries are 500 m boxes with 3 h windows (DESIGN.md §4).
    query_spatial: float = 500.0
    query_duration: float = 3 * 3600.0
    seed: int = 0


def traverse_cube(
    rt: QDTSRuntime,
    node: OctreeNode,
    policy: DQN | None,
    *,
    max_depth: int,
    record: list | None = None,
    greedy: bool = True,
) -> OctreeNode:
    """Algorithm 2: walk down from ``node`` until the policy stops, a
    leaf is hit, or depth ``E`` is reached. ``record`` collects
    (state, action, mask) transitions for training; ``greedy=False``
    keeps the policy's ε-greedy exploration on (training time)."""
    while True:
        state, mask = rt.cube_state(node)
        if node.children is None or node.depth >= max_depth:
            if record is not None:
                record.append((state, 8, mask))
            return node
        if policy is None:
            action = 8  # no Agent-Cube: stop immediately (ablation)
        else:
            action = policy.act(state, mask, greedy=greedy)
        if record is not None:
            record.append((state, action, mask))
        if action == 8:
            return node
        node = node.children[action]


def choose_point(
    rt: QDTSRuntime,
    node: OctreeNode,
    policy: DQN | None,
    *,
    record: list | None = None,
    greedy: bool = True,
) -> int | None:
    """Algorithm 3: pick the point to insert from cube ``node``; returns
    the global row or None when the cube holds no candidates."""
    state, mask, cand = rt.point_state(node)
    if len(cand) == 0:
        return None
    if policy is None:
        action = 0  # max-v_s point (ablation / paper's "maximum value")
    else:
        action = policy.act(state, mask, greedy=greedy)
    if record is not None:
        record.append((state, action, mask))
    return int(cand[action])


def rl4qdts_simplify(
    db: pd.DataFrame,
    ratio: float,
    *,
    cube_policy: DQN | None = None,
    point_policy: DQN | None = None,
    config: RL4QDTSConfig | None = None,
    use_agent_cube: bool = True,
    use_agent_point: bool = True,
    centers: np.ndarray | None = None,
    rng: np.random.Generator | None = None,
) -> pd.DataFrame:
    """Algorithm 1: simplify ``db`` to ``ratio`` of its points."""
    cfg = config or RL4QDTSConfig()
    rng = rng or np.random.default_rng(cfg.seed)
    if centers is None:
        centers = query_centers(
            db,
            n=cfg.n_query_centers,
            distribution=cfg.distribution,
            seed=cfg.seed,
        )
    rt = QDTSRuntime(db, centers, max_depth=cfg.max_depth, leaf_size=cfg.leaf_size, k=cfg.k)
    budget = max(rt.n_selected, int(round(ratio * rt.n)))
    cpol = cube_policy if use_agent_cube else None
    ppol = point_policy if use_agent_point else None
    # Dropping Agent-Cube reverts start sampling to the data
    # distribution (paper Section V-B(3)); the full model samples start
    # cubes by the query distribution.
    sampling = "query" if use_agent_cube else "data"
    while rt.n_selected < budget:
        nodes, w = rt.start_nodes(cfg.start_level, by=sampling)
        if not nodes:
            break
        start = nodes[rng.choice(len(nodes), p=w)]
        cube = traverse_cube(rt, start, cpol, max_depth=cfg.max_depth) if use_agent_cube else start
        row = choose_point(rt, cube, ppol)
        if row is None:
            continue  # cube raced empty (all candidates already selected)
        rt.insert(row)
    return rt.simplified_db()

"""RLTS+ baseline (Wang, Long & Cong, ICDE'21) — RL-driven Bottom-Up.

RLTS+ keeps the Bottom-Up skeleton but replaces the "drop the point
with the smallest removal error" heuristic by a learned policy: at each
step the J candidate points with the smallest removal errors form the
state (their errors, normalized), and a DQN picks which of the J to
drop. The reward penalizes increasing the running maximum error of the
simplification — the EDTS objective.

Training runs on small synthetic trajectories (the original trains per
dataset offline; here a few thousand transitions suffice for the tiny
network — see DESIGN.md §4 on scale). Policies are cached per error
measure by :func:`get_rlts_policy`.
"""
from __future__ import annotations

import heapq
import zlib

import numpy as np

from repro.baselines.bottomup import Traj
from repro.core.dqn import DQN
from repro.core.errors import point_errors

J = 3  # candidate-set size (the RLTS+ paper's small action space)


def _state(errs: np.ndarray) -> np.ndarray:
    """Normalized error vector of the J candidates, padded with 1s (a
    missing candidate looks maximally expensive so the policy avoids
    it; those actions are masked anyway)."""
    s = np.ones(J)
    if len(errs):
        scale = errs.max() if errs.max() > 0 else 1.0
        s[: len(errs)] = errs / scale
    return s


def _err(x, y, t, i, a, b, measure) -> float:
    return float(point_errors(x, y, t, np.array([i]), np.array([a]), np.array([b]), measure)[0])


def rlts_select(
    trajs: list[Traj],
    budget: int,
    measure: str,
    policy: DQN,
    *,
    rng: np.random.Generator | None = None,
    learn: bool = False,
) -> list[np.ndarray]:
    """Bottom-Up with the policy choosing among the J cheapest drops.

    With ``learn=True`` the policy is also trained online (used by
    :func:`train_rlts`); transitions use reward
    −max(0, e_dropped − running_max)."""
    prevs = [np.arange(-1, len(tr[0]) - 1) for tr in trajs]
    nexts = [np.arange(1, len(tr[0]) + 1) for tr in trajs]
    alive = [np.ones(len(tr[0]), dtype=bool) for tr in trajs]
    counts = [len(tr[0]) for tr in trajs]
    version = [np.zeros(len(tr[0]), dtype=np.int64) for tr in trajs]
    kept = sum(counts)
    heap: list = []
    for ti, (x, y, t) in enumerate(trajs):
        for i in range(1, len(x) - 1):
            heapq.heappush(heap, (_err(x, y, t, i, i - 1, i + 1, measure), ti, i, 0))
    budget = max(budget, 2 * len(trajs))
    running_max = 0.0
    prev_sa: tuple | None = None
    while kept > budget:
        # Pop up to J valid candidates.
        cands: list[tuple] = []
        while heap and len(cands) < J:
            e, ti, i, ver = heapq.heappop(heap)
            if alive[ti][i] and version[ti][i] == ver and counts[ti] > 2:
                cands.append((e, ti, i))
        if not cands:
            break
        errs = np.array([c[0] for c in cands])
        s = _state(errs)
        mask = np.zeros(J, dtype=bool)
        mask[: len(cands)] = True
        a = policy.act(s, mask, greedy=not learn)
        e, ti, i = cands[a]
        # Unchosen candidates go back.
        for k, (ek, tik, ik) in enumerate(cands):
            if k != a:
                heapq.heappush(heap, (ek, tik, ik, int(version[tik][ik])))
        x, y, t = trajs[ti]
        p, nx = int(prevs[ti][i]), int(nexts[ti][i])
        alive[ti][i] = False
        counts[ti] -= 1
        kept -= 1
        nexts[ti][p] = nx
        prevs[ti][nx] = p
        for jn in (p, nx):
            if 0 < jn < len(x) - 1 and alive[ti][jn]:
                version[ti][jn] += 1
                heapq.heappush(
                    heap,
                    (_err(x, y, t, jn, int(prevs[ti][jn]), int(nexts[ti][jn]), measure),
                     ti, jn, int(version[ti][jn])),
                )
        if learn:
            r = -max(0.0, e - running_max)
            if prev_sa is not None:
                ps, pa, pm = prev_sa
                policy.remember(ps, pa, prev_r, s, False, mask)
                policy.learn()
            prev_sa = (s, a, mask)
            prev_r = r
        running_max = max(running_max, e)
    if learn and prev_sa is not None:
        ps, pa, _ = prev_sa
        policy.remember(ps, pa, prev_r, None, True)
        policy.learn()
    return [np.nonzero(al)[0].astype(np.int64) for al in alive]


def train_rlts(
    measure: str,
    *,
    episodes: int = 30,
    traj_len: int = 80,
    ratio: float = 0.2,
    seed: int = 0,
) -> DQN:
    """Train an RLTS+ policy on synthetic random-walk trajectories."""
    g = np.random.default_rng(seed)
    policy = DQN(J, J, seed=seed, target_sync=50)
    for _ in range(episodes):
        steps = g.gamma(2.0, 20.0, traj_len)
        ang = np.cumsum(g.normal(0, 0.4, traj_len))
        x = np.cumsum(steps * np.cos(ang))
        y = np.cumsum(steps * np.sin(ang))
        t = np.cumsum(g.uniform(1, 5, traj_len))
        rlts_select([(x, y, t)], int(ratio * traj_len), measure, policy, learn=True)
    return policy


_POLICY_CACHE: dict[str, DQN] = {}


def get_rlts_policy(measure: str) -> DQN:
    """Cached trained policy per error measure (deterministic seed)."""
    if measure not in _POLICY_CACHE:
        _POLICY_CACHE[measure] = train_rlts(measure, seed=zlib.crc32(measure.encode()) % 1000)
    return _POLICY_CACHE[measure]


def simplify_rlts(
    x: np.ndarray, y: np.ndarray, t: np.ndarray, budget: int, measure: str,
    policy: DQN | None = None,
) -> np.ndarray:
    """Per-trajectory RLTS+ with the cached (or given) policy."""
    pol = policy or get_rlts_policy(measure)
    return rlts_select([(x, y, t)], max(2, budget), measure, pol)[0]

"""Deep Q-Network in pure numpy.

The paper (Section V-A) uses two-layer feedforward networks — 25 tanh
hidden units, linear output over the action space — trained with deep Q
learning with replay memory (Mnih et al. 2013), Adam (lr 0.01), discount
0.99, ε-greedy with decay 0.99 down to ε=0.1, replay size 2000. The
container has no torch/tensorflow, so the identical architecture is
implemented here in numpy (see DESIGN.md §4); the networks are tiny
(≤ ~700 weights) so exact numpy backprop is fast.

Action masking: both agents have state-dependent invalid actions (empty
child cubes for Agent-Cube, fewer than K trajectories for Agent-Point);
``act`` and the TD target max are computed over valid actions only.
"""
from __future__ import annotations

import io
import pickle
from collections import deque

import numpy as np

_NEG = -1e9  # Q-value assigned to masked (invalid) actions


class MLP:
    """in_dim → hidden (tanh) → out_dim (linear), with Adam."""

    def __init__(self, in_dim: int, out_dim: int, hidden: int = 25, *, seed: int = 0, lr: float = 0.01):
        g = np.random.default_rng(seed)
        s1 = np.sqrt(2.0 / (in_dim + hidden))
        s2 = np.sqrt(2.0 / (hidden + out_dim))
        self.params = {
            "W1": g.normal(0, s1, (in_dim, hidden)),
            "b1": np.zeros(hidden),
            "W2": g.normal(0, s2, (hidden, out_dim)),
            "b2": np.zeros(out_dim),
        }
        self.lr = lr
        self._m = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._v = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._step = 0

    def forward(self, x: np.ndarray) -> np.ndarray:
        x = np.atleast_2d(x)
        h = np.tanh(x @ self.params["W1"] + self.params["b1"])
        return h @ self.params["W2"] + self.params["b2"]

    def train_on(self, x: np.ndarray, actions: np.ndarray, targets: np.ndarray) -> float:
        """One Adam step on 0.5·(Q(s,a) − target)² averaged over the batch.

        Returns the batch MSE (for monitoring/tests)."""
        x = np.atleast_2d(x)
        n = len(x)
        h = np.tanh(x @ self.params["W1"] + self.params["b1"])
        q = h @ self.params["W2"] + self.params["b2"]
        qa = q[np.arange(n), actions]
        err = qa - targets  # (n,)
        # dL/dq is nonzero only at the taken action.
        dq = np.zeros_like(q)
        dq[np.arange(n), actions] = err / n
        grads = {
            "W2": h.T @ dq,
            "b2": dq.sum(axis=0),
        }
        dh = dq @ self.params["W2"].T * (1 - h * h)
        grads["W1"] = x.T @ dh
        grads["b1"] = dh.sum(axis=0)
        self._adam(grads)
        return float(np.mean(err * err))

    def _adam(self, grads: dict, beta1: float = 0.9, beta2: float = 0.999, eps: float = 1e-8) -> None:
        self._step += 1
        for k, g in grads.items():
            self._m[k] = beta1 * self._m[k] + (1 - beta1) * g
            self._v[k] = beta2 * self._v[k] + (1 - beta2) * g * g
            mh = self._m[k] / (1 - beta1**self._step)
            vh = self._v[k] / (1 - beta2**self._step)
            self.params[k] -= self.lr * mh / (np.sqrt(vh) + eps)

    def copy_from(self, other: "MLP") -> None:
        for k in self.params:
            self.params[k] = other.params[k].copy()


class DQN:
    """ε-greedy DQN agent with replay memory and a target network."""

    def __init__(
        self,
        in_dim: int,
        n_actions: int,
        *,
        hidden: int = 25,
        lr: float = 0.01,
        gamma: float = 0.99,
        eps: float = 1.0,
        eps_min: float = 0.1,
        eps_decay: float = 0.99,
        replay_size: int = 2000,
        batch_size: int = 32,
        target_sync: int = 100,
        seed: int = 0,
    ):
        self.in_dim = in_dim
        self.n_actions = n_actions
        self.q = MLP(in_dim, n_actions, hidden, seed=seed, lr=lr)
        self.target = MLP(in_dim, n_actions, hidden, seed=seed, lr=lr)
        self.target.copy_from(self.q)
        self.gamma = gamma
        self.eps = eps
        self.eps_min = eps_min
        self.eps_decay = eps_decay
        self.replay: deque = deque(maxlen=replay_size)
        self.batch_size = batch_size
        self.target_sync = target_sync
        self._learn_steps = 0
        self.rng = np.random.default_rng(seed + 1)

    # -- acting ------------------------------------------------------------

    def q_values(self, state: np.ndarray, mask: np.ndarray | None = None) -> np.ndarray:
        qv = self.q.forward(state)[0].copy()
        if mask is not None:
            qv[~mask] = _NEG
        return qv

    def act(self, state: np.ndarray, mask: np.ndarray | None = None, *, greedy: bool = False) -> int:
        """Sample an ε-greedy (or greedy) action among valid ones."""
        if mask is None:
            mask = np.ones(self.n_actions, dtype=bool)
        valid = np.nonzero(mask)[0]
        if len(valid) == 0:
            raise ValueError("no valid actions")
        if not greedy and self.rng.random() < self.eps:
            return int(self.rng.choice(valid))
        return int(np.argmax(self.q_values(state, mask)))

    # -- learning ----------------------------------------------------------

    def remember(self, s, a, r, s2, done, mask2=None) -> None:
        """``s2``/``mask2`` may be None when the episode ends (done)."""
        self.replay.append((np.asarray(s, float), int(a), float(r),
                            None if s2 is None else np.asarray(s2, float),
                            bool(done),
                            None if mask2 is None else np.asarray(mask2, bool)))

    def learn(self) -> float | None:
        """One replay step; returns the batch loss or None if not enough
        samples yet. Decays ε per learn call."""
        if len(self.replay) < self.batch_size:
            return None
        picks = self.rng.choice(len(self.replay), self.batch_size, replace=False)
        batch = [self.replay[int(i)] for i in picks]
        s = np.stack([b[0] for b in batch])
        a = np.array([b[1] for b in batch])
        r = np.array([b[2] for b in batch])
        targets = r.copy()
        live = [k for k, b in enumerate(batch) if not b[4] and b[3] is not None]
        if live:
            s2 = np.stack([batch[k][3] for k in live])
            q2 = self.target.forward(s2)
            for row, k in enumerate(live):
                m2 = batch[k][5]
                qrow = q2[row].copy()
                if m2 is not None:
                    qrow[~m2] = _NEG
                targets[k] += self.gamma * qrow.max()
        loss = self.q.train_on(s, a, targets)
        self._learn_steps += 1
        if self._learn_steps % self.target_sync == 0:
            self.target.copy_from(self.q)
        self.eps = max(self.eps_min, self.eps * self.eps_decay)
        return loss

    # -- (de)serialization — for broadcasting a trained policy -------------

    def to_bytes(self) -> bytes:
        buf = io.BytesIO()
        pickle.dump(
            {
                "in_dim": self.in_dim,
                "n_actions": self.n_actions,
                "params": self.q.params,
                "gamma": self.gamma,
            },
            buf,
        )
        return buf.getvalue()

    @classmethod
    def from_bytes(cls, data: bytes) -> "DQN":
        d = pickle.loads(data)
        agent = cls(d["in_dim"], d["n_actions"], gamma=d["gamma"], eps=0.0, eps_min=0.0)
        agent.q.params = {k: np.asarray(v) for k, v in d["params"].items()}
        agent.target.copy_from(agent.q)
        return agent

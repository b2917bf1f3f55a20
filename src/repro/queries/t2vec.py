"""t2vec-lite — a learned-style trajectory embedding similarity.

The paper instantiates the kNN dissimilarity with t2vec (Li et al.,
ICDE'18), a seq2seq model trained to embed trajectories so that nearby
routes embed nearby and the embedding is robust to point dropping. A
seq2seq model cannot be trained in this offline container (and the paper
notes its solution "is orthogonal to the dissimilarity measure used"),
so we substitute a deterministic embedding with the same two properties
(DESIGN.md §4):

1. tokenize a trajectory into the sequence of spatial grid cells it
   visits (consecutive duplicates collapsed) — dropping points rarely
   changes the cell sequence, giving t2vec-style robustness;
2. embed each cell with a seeded random Gaussian vector (the classic
   random-projection feature map) and average the visited cells'
   vectors with an exponential position decay so that route order
   matters;
3. dissimilarity = Euclidean distance between trajectory embeddings.
"""
from __future__ import annotations

import numpy as np

from repro.synth_data import TRAJ_EXTENT


class T2VecLite:
    """Deterministic trajectory embedder (shared by D and D' sides)."""

    def __init__(
        self,
        *,
        cell_size: float = 1000.0,
        dim: int = 32,
        decay: float = 0.98,
        extent: float = TRAJ_EXTENT,
        seed: int = 7,
    ):
        self.cell_size = cell_size
        self.dim = dim
        self.decay = decay
        self.n_side = int(np.ceil(extent / cell_size)) + 1
        g = np.random.default_rng(seed)
        self._table = g.normal(0, 1.0, (self.n_side * self.n_side, dim))

    def cells(self, x: np.ndarray, y: np.ndarray) -> np.ndarray:
        cx = np.clip((np.asarray(x) / self.cell_size).astype(np.int64), 0, self.n_side - 1)
        cy = np.clip((np.asarray(y) / self.cell_size).astype(np.int64), 0, self.n_side - 1)
        toks = cy * self.n_side + cx
        if len(toks) == 0:
            return toks
        keep = np.ones(len(toks), dtype=bool)
        keep[1:] = toks[1:] != toks[:-1]  # collapse consecutive duplicates
        return toks[keep]

    def embed(self, x: np.ndarray, y: np.ndarray) -> np.ndarray:
        toks = self.cells(x, y)
        if len(toks) == 0:
            return np.zeros(self.dim)
        w = self.decay ** np.arange(len(toks), dtype=np.float64)
        w /= w.sum()
        return w @ self._table[toks]

    def distance(self, xa, ya, xb, yb) -> float:
        return float(np.linalg.norm(self.embed(xa, ya) - self.embed(xb, yb)))

"""Query-accuracy quality measures (Eq. 3 of the paper).

The results on the original database ``D`` are the ground truth; the
quality of the results on the simplified database ``D'`` is the F1-score
of the returned trajectory sets. For clustering, the sets compared are
sets of *pairs* of trajectories that share a cluster.
"""
from __future__ import annotations

from itertools import combinations
from typing import Iterable, Mapping


def f1(r_o: Iterable, r_s: Iterable) -> float:
    """F1 between a ground-truth set ``r_o`` (results on D) and ``r_s``
    (results on D'). Empty/empty counts as perfect agreement (1.0)."""
    r_o, r_s = set(r_o), set(r_s)
    if not r_o and not r_s:
        return 1.0
    if not r_o or not r_s:
        return 0.0
    inter = len(r_o & r_s)
    p = inter / len(r_s)
    r = inter / len(r_o)
    return 0.0 if p + r == 0 else 2 * p * r / (p + r)


def mean_f1(results_o: Mapping, results_s: Mapping) -> float:
    """Mean per-query F1 over the union of query ids (a query missing
    from one side is scored against the empty set)."""
    qids = set(results_o) | set(results_s)
    if not qids:
        return 1.0
    return sum(f1(results_o.get(q, ()), results_s.get(q, ())) for q in qids) / len(qids)


def cluster_pairs(labels: Mapping) -> set:
    """Set of unordered trajectory pairs sharing a cluster. ``labels``
    maps traj_id → cluster label (or an iterable of labels when a
    trajectory's segments land in several clusters); label −1 is noise."""
    by_cluster: dict = {}
    for tid, lab in labels.items():
        labs = lab if isinstance(lab, (set, frozenset, list, tuple)) else (lab,)
        for c in labs:
            if c == -1:
                continue
            by_cluster.setdefault(c, set()).add(tid)
    pairs: set = set()
    for members in by_cluster.values():
        pairs.update(frozenset(p) for p in combinations(sorted(members), 2))
    return pairs


def clustering_f1(labels_o: Mapping, labels_s: Mapping) -> float:
    """Pair-based F1 between two clusterings (paper, Section III-B)."""
    return f1(cluster_pairs(labels_o), cluster_pairs(labels_s))

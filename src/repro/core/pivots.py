"""Pivot trajectory selection (paper §III-B).

"We uniformly and randomly sample m groups of N_p trajectories. In each
group, we compute the distances of any two trajectories, and let the sum
of all distances be the score of the group. Finally, we choose the N_p
trajectories in the group with the largest score."
"""
from __future__ import annotations

from typing import Callable, Sequence

import numpy as np


def select_pivots(
    pool: Sequence[np.ndarray],
    n_pivots: int,
    fn: Callable[[np.ndarray, np.ndarray], float],
    *,
    n_groups: int = 10,
    seed: int = 0,
) -> list[np.ndarray]:
    """Pick ``n_pivots`` pivot trajectories from a candidate ``pool``.

    ``pool`` is a uniform random sample of the dataset (collected on the
    driver); ``fn`` is the exact distance kernel of the active measure.
    Deterministic in ``seed``.
    """
    if n_pivots <= 0:
        return []
    pool = list(pool)
    if len(pool) <= n_pivots:
        return pool
    rng = np.random.default_rng(seed)
    best_score, best_group = -1.0, None
    for _ in range(n_groups):
        idx = rng.choice(len(pool), size=n_pivots, replace=False)
        score = 0.0
        for a in range(n_pivots):
            for b in range(a + 1, n_pivots):
                score += fn(pool[idx[a]], pool[idx[b]])
        if score > best_score:
            best_score, best_group = score, idx
    return [pool[i] for i in best_group]


def query_pivot_dists(
    qpts: np.ndarray,
    pivots: Sequence[np.ndarray],
    fn: Callable[[np.ndarray, np.ndarray], float],
) -> np.ndarray:
    """d_qp[i] — exact distance from the query to each pivot (§IV-D)."""
    return np.array([fn(qpts, p) for p in pivots], dtype=float)

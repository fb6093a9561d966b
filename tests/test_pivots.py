"""Pivot selection tests (§III-B group-sampling heuristic)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.measures import get_measure
from repro.core.pivots import query_pivot_dists, select_pivots
from tests.util import rnd_dataset, rnd_query

FN = get_measure("hausdorff")
POOL = list(rnd_dataset(0, 40).values())


def test_count_and_membership():
    pivots = select_pivots(POOL, 5, FN, seed=0)
    assert len(pivots) == 5
    ids = {id(p) for p in POOL}
    assert all(id(p) in ids for p in pivots)


def test_deterministic():
    a = select_pivots(POOL, 5, FN, seed=1)
    b = select_pivots(POOL, 5, FN, seed=1)
    assert all((x == y).all() for x, y in zip(a, b))


def test_seed_changes_choice():
    a = select_pivots(POOL, 3, FN, seed=1)
    b = select_pivots(POOL, 3, FN, seed=2)
    assert [id(x) for x in a] != [id(x) for x in b]


def test_small_pool_passthrough():
    pivots = select_pivots(POOL[:3], 5, FN)
    assert len(pivots) == 3


def test_zero_pivots():
    assert select_pivots(POOL, 0, FN) == []


def test_picks_spread_out_group():
    """The chosen group's pairwise-distance score must be the max over
    the sampled groups — re-simulate and compare."""
    rng = np.random.default_rng(3)
    n_p, n_groups = 3, 10
    best = select_pivots(POOL, n_p, FN, n_groups=n_groups, seed=3)

    def score(group):
        return sum(
            FN(group[a], group[b])
            for a in range(n_p)
            for b in range(a + 1, n_p)
        )

    got = score(best)
    sims = []
    for _ in range(n_groups):
        idx = rng.choice(len(POOL), size=n_p, replace=False)
        sims.append(score([POOL[i] for i in idx]))
    assert got == pytest.approx(max(sims))


def test_query_pivot_dists():
    q = rnd_query(0)
    pivots = POOL[:4]
    d = query_pivot_dists(q, pivots, FN)
    assert d.shape == (4,)
    assert d[0] == pytest.approx(FN(q, pivots[0]))

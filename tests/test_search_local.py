"""Local best-first search (Algorithm 2) exactness vs brute force across
all measures, trie modes, k values, and pruning-effectiveness checks."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.measures import METRICS, get_measure
from repro.core.rptrie import RPTrie
from repro.core.search import SearchStats, brute_force_topk, search_topk
from repro.core.zorder import Grid
from tests.util import ALL, MEASURE_PARAMS, rnd_dataset, rnd_query, topk_dists_equal

GRID = Grid.from_bounds(-5, -5, 15, 15, delta=0.8)
DATA = rnd_dataset(2, 200)
PIVOTS = [DATA[10], DATA[50], DATA[99]]


def make_trie(measure, mode=None, pivots=PIVOTS, delta=None):
    kw = MEASURE_PARAMS[measure]
    fn = get_measure(measure, **kw)
    grid = GRID if delta is None else Grid.from_bounds(-5, -5, 15, 15, delta=delta)
    trie = RPTrie(grid, fn, pivots if measure in METRICS else [])
    if mode is None:
        mode = "opt" if measure == "hausdorff" else "basic"
    trie.build(list(DATA.items()), mode=mode)
    return trie


def run_case(measure, k, trie, seed=0, d_k=np.inf):
    kw = MEASURE_PARAMS[measure]
    q = rnd_query(seed)
    stats = SearchStats()
    got = search_topk(trie, DATA, q, k, measure=measure, stats=stats, d_k=d_k, **kw)
    exp = brute_force_topk(DATA.items(), q, k, measure=measure, **kw)
    return got, exp, stats


@pytest.mark.parametrize("measure", ALL)
@pytest.mark.parametrize("k", [1, 5, 20])
@pytest.mark.parametrize("seed", [0, 1])
def test_exact_topk(measure, k, seed):
    trie = make_trie(measure)
    got, exp, _ = run_case(measure, k, trie, seed=seed)
    assert topk_dists_equal(got, exp)
    assert len(got) == k


@pytest.mark.parametrize("mode", ["basic", "dedup", "opt"])
def test_hausdorff_all_modes_exact(mode):
    trie = make_trie("hausdorff", mode=mode)
    got, exp, _ = run_case("hausdorff", 10, trie)
    assert topk_dists_equal(got, exp)


@pytest.mark.parametrize("measure", ["hausdorff", "frechet", "dtw"])
@pytest.mark.parametrize("delta", [0.3, 0.8, 2.0])
def test_exact_across_grid_granularity(measure, delta):
    trie = make_trie(measure, delta=delta)
    got, exp, _ = run_case(measure, 10, trie, seed=3)
    assert topk_dists_equal(got, exp)


@pytest.mark.parametrize("measure", sorted(METRICS))
def test_exact_without_pivots(measure):
    trie = make_trie(measure, pivots=[])
    got, exp, _ = run_case(measure, 10, trie, seed=4)
    assert topk_dists_equal(got, exp)


def test_k_exceeds_dataset():
    trie = make_trie("hausdorff")
    got, exp, _ = run_case("hausdorff", len(DATA) + 50, trie)
    assert len(got) == len(DATA)
    assert topk_dists_equal(got, exp)


def test_k_equals_dataset():
    trie = make_trie("hausdorff")
    got, exp, _ = run_case("hausdorff", len(DATA), trie)
    assert topk_dists_equal(got, exp)


def test_dk_seed_restricts_results():
    """Seeding d_k (distributed merge path) must not break correctness:
    every returned distance < d_k and the returned prefix is exact."""
    trie = make_trie("hausdorff")
    _, exp, _ = run_case("hausdorff", 20, trie, seed=5)
    cut = exp[7][0]
    got, _, _ = run_case("hausdorff", 20, trie, seed=5, d_k=cut)
    assert all(d < cut for d, _ in got)
    assert topk_dists_equal(got, exp[: len(got)])


@pytest.mark.parametrize("measure", ALL)
def test_pruning_effective(measure):
    """Best-first + bounds must skip most exact computations (the point
    of the RP-Trie) while staying exact."""
    trie = make_trie(measure)
    got, exp, stats = run_case(measure, 10, trie, seed=6)
    assert topk_dists_equal(got, exp)
    assert stats.exact_computed < len(DATA) * 0.75, stats.exact_computed


def test_pruning_stats_counted():
    trie = make_trie("hausdorff")
    _, _, stats = run_case("hausdorff", 5, trie)
    assert stats.nodes_expanded > 0
    assert stats.leaves_visited > 0
    assert stats.pushed >= stats.leaves_visited


def test_pivots_reduce_work():
    """With pivots the search should do no more exact computations than
    without (usually strictly fewer)."""
    q = rnd_query(7)
    kw = {}
    s_no, s_yes = SearchStats(), SearchStats()
    t_no = make_trie("hausdorff", pivots=[])
    t_yes = make_trie("hausdorff")
    a = search_topk(t_no, DATA, q, 10, measure="hausdorff", stats=s_no)
    b = search_topk(t_yes, DATA, q, 10, measure="hausdorff", stats=s_yes)
    assert topk_dists_equal(a, b)
    assert s_yes.exact_computed <= s_no.exact_computed


def test_identical_trajectories_share_leaf():
    """Duplicate trajectories collapse into one leaf and both ids are
    returned with distance 0 for a query equal to them."""
    data = dict(DATA)
    data[9001] = data[0].copy()
    trie = RPTrie(GRID, get_measure("hausdorff"), [])
    trie.build(list(data.items()), mode="opt")
    got = search_topk(trie, data, data[0], 2, measure="hausdorff")
    assert {t for _, t in got} == {0, 9001}
    assert all(d == pytest.approx(0.0, abs=1e-12) for d, _ in got)


def test_brute_force_ordering_ties():
    res = brute_force_topk(DATA.items(), rnd_query(8), 10, measure="hausdorff")
    ds = [d for d, _ in res]
    assert ds == sorted(ds)


@pytest.mark.parametrize("measure", ["edr", "lcss"])
@pytest.mark.parametrize("eps", [0.1, 0.5, 2.0])
def test_eps_variants_exact(measure, eps):
    fn_kw = {"eps": eps}
    trie = RPTrie(GRID, get_measure(measure, **fn_kw), [])
    trie.build(list(DATA.items()), mode="basic")
    q = rnd_query(9)
    got = search_topk(trie, DATA, q, 10, measure=measure, **fn_kw)
    exp = brute_force_topk(DATA.items(), q, 10, measure=measure, **fn_kw)
    assert topk_dists_equal(got, exp)


def test_erp_gap_variants_exact():
    for gap in [(0.0, 0.0), (5.0, 5.0), (-3.0, 12.0)]:
        trie = RPTrie(GRID, get_measure("erp", gap=gap), [])
        trie.build(list(DATA.items()), mode="basic")
        q = rnd_query(10)
        got = search_topk(trie, DATA, q, 5, measure="erp", gap=gap)
        exp = brute_force_topk(DATA.items(), q, 5, measure="erp", gap=gap)
        assert topk_dists_equal(got, exp)


def test_single_point_query():
    q = np.array([[4.0, 4.0]])
    trie = make_trie("hausdorff")
    got = search_topk(trie, DATA, q, 5, measure="hausdorff")
    exp = brute_force_topk(DATA.items(), q, 5, measure="hausdorff")
    assert topk_dists_equal(got, exp)


@pytest.mark.parametrize("measure", ["frechet", "dtw"])
def test_single_point_query_dp_measures(measure):
    q = np.array([[4.0, 4.0]])
    trie = make_trie(measure)
    got = search_topk(trie, DATA, q, 5, measure=measure)
    exp = brute_force_topk(DATA.items(), q, 5, measure=measure)
    assert topk_dists_equal(got, exp)

"""Global partitioning tests (§V-A/B): strategy semantics, balance, the
cluster-spreading property that distinguishes heterogeneous from
homogeneous, and the geohash granularity loop."""
from __future__ import annotations

import numpy as np
import pytest
import pyspark.sql.functions as F

from repro.core.partition import (
    assign_partitions, cluster_trajectories, dataset_bounds,
)

P = 4


@pytest.fixture(scope="module")
def grouped_df(spark):
    """4 groups × 8 near-identical trajectories each (distinct clusters)."""
    rows = []
    rng = np.random.default_rng(0)
    tid = 0
    for g in range(4):
        base = np.array([g * 100.0, g * 100.0])
        for _ in range(8):
            pts = base + rng.normal(0, 0.01, (12, 2)).cumsum(0)
            rows.append((tid, pts[:, 0].tolist(), pts[:, 1].tolist()))
            tid += 1
    return spark.createDataFrame(
        rows, "tid long, xs array<double>, ys array<double>"
    ).cache()


def pid_map(df):
    return {r.tid: r.pid for r in df.select("tid", "pid").collect()}


def test_bounds(grouped_df):
    minx, miny, maxx, maxy = dataset_bounds(grouped_df)
    assert minx <= 0.5 and maxx >= 299.0
    assert miny <= 0.5 and maxy >= 299.0


@pytest.mark.parametrize("strategy", ["heterogeneous", "homogeneous", "random"])
def test_every_trajectory_assigned_once(grouped_df, strategy):
    out = assign_partitions(grouped_df, P, strategy)
    pids = pid_map(out)
    assert len(pids) == 32
    assert set(pids.values()) <= set(range(P))


def test_heterogeneous_balance(grouped_df):
    out = assign_partitions(grouped_df, P, "heterogeneous")
    sizes = (
        out.groupBy("pid").count().toPandas().set_index("pid")["count"]
    )
    assert sizes.max() - sizes.min() <= 1  # round-robin balance


def test_homogeneous_balance(grouped_df):
    out = assign_partitions(grouped_df, P, "homogeneous")
    sizes = (
        out.groupBy("pid").count().toPandas().set_index("pid")["count"]
    )
    assert sizes.max() - sizes.min() <= 1  # contiguous equal chunks


def test_heterogeneous_spreads_similar_trajectories(grouped_df):
    """§V-B: each group of near-identical trajectories must be spread
    across *all* partitions (round-robin over sorted clusters)."""
    out = assign_partitions(grouped_df, P, "heterogeneous")
    pids = pid_map(out)
    for g in range(4):
        group_pids = {pids[t] for t in range(g * 8, (g + 1) * 8)}
        assert group_pids == set(range(P)), f"group {g} not spread: {group_pids}"


def test_homogeneous_concentrates_similar_trajectories(grouped_df):
    """§V-A: homogeneous placement keeps each similarity group in one
    partition."""
    out = assign_partitions(grouped_df, P, "homogeneous")
    pids = pid_map(out)
    for g in range(4):
        group_pids = {pids[t] for t in range(g * 8, (g + 1) * 8)}
        assert len(group_pids) == 1, f"group {g} split: {group_pids}"


def test_random_deterministic(grouped_df):
    a = pid_map(assign_partitions(grouped_df, P, "random"))
    b = pid_map(assign_partitions(grouped_df, P, "random"))
    assert a == b


def test_heterogeneous_deterministic(grouped_df):
    a = pid_map(assign_partitions(grouped_df, P, "heterogeneous"))
    b = pid_map(assign_partitions(grouped_df, P, "heterogeneous"))
    assert a == b


def test_unknown_strategy(grouped_df):
    with pytest.raises(ValueError):
        assign_partitions(grouped_df, P, "bogus")


def test_cluster_granularity_loop(grouped_df):
    """The coarsening loop must stop at ≤ target clusters (4 spatial
    groups exist, so target 8 is reachable)."""
    clustered, bits, n_clusters = cluster_trajectories(grouped_df, 8)
    assert n_clusters <= 8
    assert 1 <= bits <= 14
    # near-identical trajectories share a cluster key at the chosen bits
    keys = {r.tid: r.cluster for r in clustered.select("tid", "cluster").collect()}
    for g in range(4):
        assert len({keys[t] for t in range(g * 8, (g + 1) * 8)}) == 1


def test_cluster_key_modes(grouped_df):
    for mode in ("traj", "first", "centroid"):
        clustered, _, n = cluster_trajectories(grouped_df, 8, key_mode=mode)
        assert n <= 8
        assert clustered.count() == 32


def test_partition_count_one(grouped_df):
    out = assign_partitions(grouped_df, 1, "heterogeneous")
    assert set(pid_map(out).values()) == {0}

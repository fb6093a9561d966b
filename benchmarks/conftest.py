"""Shared fixtures for the per-table benchmarks.

Benchmarks run at the `lite` T-drive scale (3,000 trajectories, 16
partitions) — large enough that pruning/partitioning effects dominate
Spark's fixed per-query overhead, small enough to finish in minutes.
Index builds happen once per configuration (module/session fixtures);
``benchmark.pedantic`` times only the distributed query.
"""
from __future__ import annotations

import numpy as np
import pytest


@pytest.fixture(scope="session")
def bench_df(spark):
    from repro import synth_data

    df = synth_data.trajectories(spark, "tdrive", profile="lite").cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def bench_query(bench_df):
    from repro import synth_data

    return synth_data.sample_queries(bench_df, 1)[0][1]


K = 10
DELTA = 0.15
NPART = 16


@pytest.fixture(scope="session")
def repose_hausdorff(spark, bench_df):
    from repro.dist.repose import Repose

    return Repose(spark, bench_df, measure="hausdorff", delta=DELTA, n_partitions=NPART)


@pytest.fixture(scope="session")
def repose_frechet(spark, bench_df):
    from repro.dist.repose import Repose

    return Repose(spark, bench_df, measure="frechet", delta=DELTA, n_partitions=NPART)


def run_query(algo, q, k=K, seeded=False):
    if seeded:
        return algo.query(q, k, seed=0)
    return algo.query(q, k)

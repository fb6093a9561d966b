"""Table VII benchmarks — REPOSE query time per partitioning strategy."""
from __future__ import annotations

import pytest

from benchmarks.conftest import DELTA, NPART, run_query


@pytest.fixture(
    scope="module", params=["heterogeneous", "homogeneous", "random"]
)
def repose_at_strategy(request, spark, bench_df):
    from repro.dist.repose import Repose

    r = Repose(
        spark, bench_df, measure="hausdorff", delta=DELTA,
        n_partitions=NPART, strategy=request.param,
    )
    r.strategy_param = request.param
    return r


def test_qt_vs_strategy(benchmark, repose_at_strategy, bench_query):
    benchmark.extra_info["strategy"] = repose_at_strategy.strategy_param
    benchmark.pedantic(run_query, args=(repose_at_strategy, bench_query), rounds=3)

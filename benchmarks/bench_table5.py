"""Table V benchmarks — REPOSE query time vs δ (T-drive-lite, Hausdorff)."""
from __future__ import annotations

import pytest

from benchmarks.conftest import NPART, run_query


@pytest.fixture(scope="module", params=[0.05, 0.15, 0.30])
def repose_at_delta(request, spark, bench_df):
    from repro.dist.repose import Repose

    r = Repose(
        spark, bench_df, measure="hausdorff", delta=request.param,
        n_partitions=NPART,
    )
    r.delta_param = request.param
    return r


def test_qt_vs_delta(benchmark, repose_at_delta, bench_query):
    benchmark.extra_info["delta"] = repose_at_delta.delta_param
    benchmark.pedantic(run_query, args=(repose_at_delta, bench_query), rounds=3)

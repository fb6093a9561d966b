"""Table VI benchmarks — REPOSE query time vs N_p (T-drive-lite, Hausdorff)."""
from __future__ import annotations

import pytest

from benchmarks.conftest import DELTA, NPART, run_query


@pytest.fixture(scope="module", params=[1, 5, 11])
def repose_at_np(request, spark, bench_df):
    from repro.dist.repose import Repose

    r = Repose(
        spark, bench_df, measure="hausdorff", delta=DELTA,
        n_partitions=NPART, n_pivots=request.param,
    )
    r.np_param = request.param
    return r


def test_qt_vs_pivots(benchmark, repose_at_np, bench_query):
    benchmark.extra_info["n_p"] = repose_at_np.np_param
    benchmark.pedantic(run_query, args=(repose_at_np, bench_query), rounds=3)

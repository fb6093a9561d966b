"""Table IX benchmarks — REPOSE vs Heter-DFT vs DFT (Hausdorff)."""
from __future__ import annotations

import pytest

from benchmarks.conftest import NPART, run_query


@pytest.fixture(scope="module", params=["homogeneous", "heterogeneous"])
def dft_variant(request, spark, bench_df):
    from repro.baselines.dft import Dft

    d = Dft(
        spark, bench_df, measure="hausdorff", n_partitions=NPART,
        strategy=request.param,
    )
    d.strategy_param = request.param
    return d


def test_qt_repose_hausdorff(benchmark, repose_hausdorff, bench_query):
    benchmark.pedantic(run_query, args=(repose_hausdorff, bench_query), rounds=3)


def test_qt_dft_variants(benchmark, dft_variant, bench_query):
    benchmark.extra_info["strategy"] = dft_variant.strategy_param
    benchmark.pedantic(
        run_query, args=(dft_variant, bench_query), kwargs={"seeded": True}, rounds=3
    )

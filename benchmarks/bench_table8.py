"""Table VIII benchmarks — REPOSE vs Heter-DITA vs DITA (Frechet)."""
from __future__ import annotations

import pytest

from benchmarks.conftest import NPART, run_query


@pytest.fixture(scope="module", params=["homogeneous", "heterogeneous"])
def dita_variant(request, spark, bench_df):
    from repro.baselines.dita import Dita

    d = Dita(
        spark, bench_df, measure="frechet", n_partitions=NPART,
        strategy=request.param,
    )
    d.strategy_param = request.param
    return d


def test_qt_repose_frechet(benchmark, repose_frechet, bench_query):
    benchmark.pedantic(run_query, args=(repose_frechet, bench_query), rounds=3)


def test_qt_dita_variants(benchmark, dita_variant, bench_query):
    benchmark.extra_info["strategy"] = dita_variant.strategy_param
    benchmark.pedantic(
        run_query, args=(dita_variant, bench_query), kwargs={"seeded": True}, rounds=3
    )

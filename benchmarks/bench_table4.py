"""Table IV benchmarks — query time of the four systems on T-drive-lite
for Hausdorff and Frechet, plus one-shot index-build (IT) benchmarks."""
from __future__ import annotations

import pytest

from benchmarks.conftest import DELTA, K, NPART, run_query


@pytest.fixture(scope="module")
def ls_hausdorff(spark, bench_df):
    from repro.baselines.ls import Ls

    return Ls(spark, bench_df, measure="hausdorff", n_partitions=NPART)


@pytest.fixture(scope="module")
def dft_hausdorff(spark, bench_df):
    from repro.baselines.dft import Dft

    return Dft(spark, bench_df, measure="hausdorff", n_partitions=NPART)


@pytest.fixture(scope="module")
def ls_frechet(spark, bench_df):
    from repro.baselines.ls import Ls

    return Ls(spark, bench_df, measure="frechet", n_partitions=NPART)


@pytest.fixture(scope="module")
def dita_frechet(spark, bench_df):
    from repro.baselines.dita import Dita

    return Dita(spark, bench_df, measure="frechet", n_partitions=NPART)


def test_qt_hausdorff_repose(benchmark, repose_hausdorff, bench_query):
    benchmark.pedantic(run_query, args=(repose_hausdorff, bench_query), rounds=3)


def test_qt_hausdorff_ls(benchmark, ls_hausdorff, bench_query):
    benchmark.pedantic(run_query, args=(ls_hausdorff, bench_query), rounds=3)


def test_qt_hausdorff_dft(benchmark, dft_hausdorff, bench_query):
    benchmark.pedantic(
        run_query, args=(dft_hausdorff, bench_query), kwargs={"seeded": True}, rounds=3
    )


def test_qt_frechet_repose(benchmark, repose_frechet, bench_query):
    benchmark.pedantic(run_query, args=(repose_frechet, bench_query), rounds=3)


def test_qt_frechet_ls(benchmark, ls_frechet, bench_query):
    benchmark.pedantic(run_query, args=(ls_frechet, bench_query), rounds=3)


def test_qt_frechet_dita(benchmark, dita_frechet, bench_query):
    benchmark.pedantic(
        run_query, args=(dita_frechet, bench_query), kwargs={"seeded": True}, rounds=3
    )


def test_it_build_repose_hausdorff(benchmark, spark, bench_df):
    from repro.dist.repose import Repose

    def build():
        r = Repose(spark, bench_df, measure="hausdorff", delta=DELTA, n_partitions=NPART)
        r.unpersist()
        return r

    benchmark.pedantic(build, rounds=1, iterations=1)


def test_it_build_dft_hausdorff(benchmark, spark, bench_df):
    from repro.baselines.dft import Dft

    def build():
        d = Dft(spark, bench_df, measure="hausdorff", n_partitions=NPART)
        d.unpersist()
        return d

    benchmark.pedantic(build, rounds=1, iterations=1)

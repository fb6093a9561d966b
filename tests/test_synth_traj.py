"""Trajectory dataset generator tests: determinism, spans, lengths,
paper-style preprocessing, query sampling, and the points-table export."""
from __future__ import annotations

import numpy as np
import pytest
import pyspark.sql.functions as F

from repro import synth_data


def test_all_datasets_registered():
    assert set(synth_data.TRAJ_DATASETS) == {
        "tdrive", "sf", "rome", "porto", "xian", "chengdu", "osm",
    }
    assert set(synth_data.DEFAULT_DELTA) == set(synth_data.TRAJ_DATASETS)


@pytest.mark.parametrize("name", sorted(synth_data.TRAJ_DATASETS))
def test_generate_each_dataset(spark, name):
    df = synth_data.trajectories(spark, name, n=40)
    pdf = df.toPandas()
    assert len(pdf) == 40
    (w, h), (ox, oy), *_ = synth_data.TRAJ_DATASETS[name]
    for _, r in pdf.iterrows():
        xs, ys = np.asarray(r["xs"]), np.asarray(r["ys"])
        assert len(xs) == len(ys) >= 10
        assert (ox - 1e-9 <= xs).all() and (xs <= ox + w + 1e-9).all()
        assert (oy - 1e-9 <= ys).all() and (ys <= oy + h + 1e-9).all()


def test_deterministic(spark):
    a = synth_data.trajectories(spark, "xian", n=30).toPandas()
    b = synth_data.trajectories(spark, "xian", n=30).toPandas()
    for i in range(30):
        assert list(a.iloc[i]["xs"]) == list(b.iloc[i]["xs"])


def test_seed_changes_data(spark):
    a = synth_data.trajectories(spark, "xian", n=10, seed=0).toPandas()
    b = synth_data.trajectories(spark, "xian", n=10, seed=1).toPandas()
    assert list(a.iloc[0]["xs"]) != list(b.iloc[0]["xs"])


def test_avg_length_roughly_respected(spark):
    df = synth_data.trajectories(spark, "tdrive", n=300, avg_len=30)
    avg = df.select(F.avg(F.size("xs"))).first()[0]
    assert 18 <= avg <= 48  # lognormal around 30, clipped at 10


def test_lengths_within_paper_window(spark):
    df = synth_data.trajectories(spark, "rome", n=200, avg_len=100)
    mn, mx = df.select(
        F.min(F.size("xs")), F.max(F.size("xs"))
    ).first()
    assert mn >= 10 and mx <= 1000


def test_profiles_differ(spark):
    lite = synth_data.TRAJ_DATASETS["tdrive"][3]
    smoke = synth_data.TRAJ_DATASETS["tdrive"][4]
    assert lite[0] > smoke[0]


def test_hotspot_clustering_present(spark):
    """Start points must be clustered (hotspots), not uniform: mean
    nearest-neighbour distance far below the uniform expectation."""
    pdf = synth_data.trajectories(spark, "xian", n=200).toPandas()
    starts = np.array([[r["xs"][0], r["ys"][0]] for _, r in pdf.iterrows()])
    from repro.core.measures import pair_dists

    d = pair_dists(starts, starts)
    np.fill_diagonal(d, np.inf)
    nn = d.min(1).mean()
    (w, h), *_ = synth_data.TRAJ_DATASETS["xian"]
    uniform_nn = 0.5 / np.sqrt(200 / (w * h))
    assert nn < uniform_nn * 0.9


# ----------------------------------------------------------- preprocessing

def test_preprocess_drops_short(spark):
    df = spark.createDataFrame(
        [(1, [0.0] * 5, [0.0] * 5), (2, [0.0] * 20, [0.0] * 20)],
        "tid long, xs array<double>, ys array<double>",
    )
    out = synth_data.preprocess_trajectories(df).toPandas()
    assert set(out["tid"] // 1000) == {2}


def test_preprocess_splits_long(spark):
    xs = [float(v) for v in range(2500)]
    df = spark.createDataFrame(
        [(7, xs, xs)], "tid long, xs array<double>, ys array<double>"
    )
    out = synth_data.preprocess_trajectories(df).toPandas().sort_values("tid")
    # 2500 → pieces of 1000/1000/500
    assert len(out) == 3
    assert [len(x) for x in out["xs"]] == [1000, 1000, 500]
    assert out.iloc[0]["xs"][0] == 0.0 and out.iloc[1]["xs"][0] == 1000.0


def test_preprocess_keeps_normal(spark):
    df = synth_data.trajectories(spark, "tdrive", n=25)
    out = synth_data.preprocess_trajectories(df)
    assert out.count() == 25


# --------------------------------------------------------------- utilities

def test_sample_queries_members_and_deterministic(spark, tdrive_smoke):
    q1 = synth_data.sample_queries(tdrive_smoke, 5)
    q2 = synth_data.sample_queries(tdrive_smoke, 5)
    assert [t for t, _ in q1] == [t for t, _ in q2]
    tids = {r.tid for r in tdrive_smoke.select("tid").collect()}
    assert all(t in tids for t, _ in q1)
    assert all(q.shape[1] == 2 for _, q in q1)


def test_points_pdf_long_format(spark):
    df = synth_data.trajectories(spark, "tdrive", n=8)
    pts = synth_data.trajectories_points_pdf(df)
    assert set(pts.columns) == {"tid", "seq", "x", "y"}
    total = df.select(F.sum(F.size("xs"))).first()[0]
    assert len(pts) == total
    assert (pts.groupby("tid")["seq"].min() == 0).all()

"""Table VIII — REPOSE vs Heter-DITA (DITA on our heterogeneous
partitioning) vs DITA, for DTW and Frechet on T-drive, Xi'an, OSM."""
from __future__ import annotations

import pandas as pd

from _common import PROFILE, build_algo, job_main, load_dataset, print_table, timed_queries

MEASURES = ("dtw", "frechet")


def run(spark, profile: str = "lite", datasets=("tdrive", "xian", "osm"),
        measures=MEASURES):
    k = PROFILE[profile]["k"]
    rows = []
    for ds in datasets:
        df, queries = load_dataset(spark, ds, profile)
        for measure in measures:
            variants = (
                ("REPOSE", "REPOSE", None),
                ("Heter-DITA", "DITA", "heterogeneous"),
                ("DITA", "DITA", None),
            )
            for label, algo, strategy in variants:
                obj = build_algo(
                    spark, algo, df, measure=measure, dataset=ds,
                    profile=profile, strategy=strategy,
                )
                qt = timed_queries(obj, queries, k)
                rows.append(
                    dict(dataset=ds, measure=measure, algo=label,
                         qt_s=round(qt["wall"], 3),
                         qt_local_s=round(qt["local"], 3))
                )
                obj.unpersist()
        df.unpersist()
    out = pd.DataFrame(rows)
    return print_table(out, f"Table VIII (profile={profile})")


if __name__ == "__main__":
    job_main(run)

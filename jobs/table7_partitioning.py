"""Table VII — effect of the global partitioning strategy on REPOSE:
heterogeneous vs homogeneous vs random, with the RP-Trie as local index,
on T-drive, Xi'an and OSM for Hausdorff and Frechet."""
from __future__ import annotations

import pandas as pd

from _common import PROFILE, build_algo, job_main, load_dataset, print_table, timed_queries

STRATEGIES = ("heterogeneous", "homogeneous", "random")
MEASURES = ("hausdorff", "frechet")


def run(spark, profile: str = "lite", datasets=("tdrive", "xian", "osm"),
        measures=MEASURES, strategies=STRATEGIES):
    k = PROFILE[profile]["k"]
    rows = []
    for ds in datasets:
        df, queries = load_dataset(spark, ds, profile)
        for measure in measures:
            for strategy in strategies:
                obj = build_algo(
                    spark, "REPOSE", df, measure=measure, dataset=ds,
                    profile=profile, strategy=strategy,
                )
                qt = timed_queries(obj, queries, k)
                rows.append(
                    dict(dataset=ds, measure=measure, strategy=strategy,
                         qt_s=round(qt["wall"], 3),
                         qt_local_s=round(qt["local"], 3))
                )
                obj.unpersist()
        df.unpersist()
    out = pd.DataFrame(rows)
    return print_table(out, f"Table VII (profile={profile})")


if __name__ == "__main__":
    job_main(run)

"""Table V — REPOSE query time vs grid cell side δ on T-drive, Xi'an and
OSM, for Hausdorff and Frechet. Also records total trie node counts,
which (together with ``trie_mode``) regenerates the Fig. 7 comparison.
"""
from __future__ import annotations

import pandas as pd

from _common import PROFILE, build_algo, job_main, load_dataset, print_table, timed_queries

#: the paper's exact δ sweeps (§VII-B Table V) — spans match, so reusable
DELTAS = {
    "tdrive": (0.01, 0.05, 0.10, 0.15, 0.20, 0.25, 0.30),
    "xian": (0.005, 0.010, 0.015, 0.020, 0.025, 0.030, 0.035),
    "osm": (0.1, 0.5, 1.0, 1.5, 2.0, 2.5, 3.0),
}
MEASURES = ("hausdorff", "frechet")


def run(spark, profile: str = "lite", datasets=("tdrive", "xian", "osm"),
        measures=MEASURES, deltas=None):
    k = PROFILE[profile]["k"]
    rows = []
    for ds in datasets:
        df, queries = load_dataset(spark, ds, profile)
        for delta in (deltas or DELTAS)[ds]:
            for measure in measures:
                obj = build_algo(
                    spark, "REPOSE", df, measure=measure, dataset=ds,
                    profile=profile, delta=delta,
                )
                qt = timed_queries(obj, queries, k)
                rows.append(
                    dict(dataset=ds, delta=delta, measure=measure,
                         qt_s=round(qt["wall"], 3),
                         qt_local_s=round(qt["local"], 3),
                         trie_nodes=obj.total_trie_nodes)
                )
                obj.unpersist()
        df.unpersist()
    out = pd.DataFrame(rows)
    return print_table(out, f"Table V (profile={profile})")


if __name__ == "__main__":
    job_main(run)

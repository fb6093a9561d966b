"""Table IV — performance overview: QT (s), IS (MB), IT (s) for
{REPOSE, DITA, DFT, LS} × {Hausdorff, Frechet, DTW} × 7 datasets.

Cells the paper marks "/" (DITA×Hausdorff; LS index rows) stay "/".
"""
from __future__ import annotations

import pandas as pd

from _common import (
    ALL_DATASETS, PROFILE, build_algo, job_main, load_dataset, print_table,
)

MEASURES = ("hausdorff", "frechet", "dtw")
ALGO_ORDER = ("REPOSE", "DITA", "DFT", "LS")


def run(spark, profile: str = "lite", datasets=ALL_DATASETS, measures=MEASURES):
    from _common import timed_queries

    k = PROFILE[profile]["k"]
    rows = []
    for ds in datasets:
        df, queries = load_dataset(spark, ds, profile)
        for measure in measures:
            for algo in ALGO_ORDER:
                if algo == "DITA" and measure == "hausdorff":
                    rows.append(
                        dict(dataset=ds, measure=measure, algo=algo,
                             qt_s=None, qt_local_s=None, is_mb=None, it_s=None)
                    )
                    continue
                obj = build_algo(
                    spark, algo, df, measure=measure, dataset=ds, profile=profile
                )
                qt = timed_queries(obj, queries, k)
                rows.append(
                    dict(
                        dataset=ds,
                        measure=measure,
                        algo=algo,
                        qt_s=round(qt["wall"], 3),
                        qt_local_s=round(qt["local"], 3),
                        is_mb=(
                            None if algo == "LS"
                            else round(obj.index_bytes / 1e6, 2)
                        ),
                        it_s=(
                            None if algo == "LS" else round(obj.build_time, 2)
                        ),
                    )
                )
                obj.unpersist()
        df.unpersist()
    out = pd.DataFrame(rows)
    return print_table(out, f"Table IV (profile={profile})")


if __name__ == "__main__":
    job_main(run)

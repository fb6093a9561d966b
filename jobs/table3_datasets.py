"""Table III (context) — statistics of the scaled synthetic datasets:
cardinality, average length, spatial span, size. Lets a reader compare
our `lite` substitutes against the paper's real-dataset statistics."""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F

from _common import ALL_DATASETS, job_main, print_table
from repro import synth_data


def run(spark, profile: str = "lite", datasets=ALL_DATASETS):
    rows = []
    for ds in datasets:
        df = synth_data.trajectories(spark, ds, profile=profile)
        agg = df.select(
            F.count("*").alias("n"),
            F.avg(F.size("xs")).alias("avg_len"),
            F.min(F.array_min("xs")).alias("minx"),
            F.max(F.array_max("xs")).alias("maxx"),
            F.min(F.array_min("ys")).alias("miny"),
            F.max(F.array_max("ys")).alias("maxy"),
            (F.sum(F.size("xs")) * 16 / 1e6).alias("size_mb"),
        ).first()
        (span_paper, _, _, _, _) = synth_data.TRAJ_DATASETS[ds]
        rows.append(
            dict(
                dataset=ds,
                cardinality=agg.n,
                avg_len=round(agg.avg_len, 1),
                span_x=round(agg.maxx - agg.minx, 2),
                span_y=round(agg.maxy - agg.miny, 2),
                paper_span=f"({span_paper[0]}, {span_paper[1]})",
                size_mb=round(agg.size_mb, 2),
            )
        )
    out = pd.DataFrame(rows)
    return print_table(out, f"Table III — dataset statistics (profile={profile})")


if __name__ == "__main__":
    job_main(run)

"""Run the complete evaluation: Tables I-IV plus the figure-shaped reports
(MST, skew), sharing one Spark-parallel sweep for Tables II/III, and print
every table with the paper's numbers alongside.

This is the one-shot reproduction driver behind EXPERIMENTS.md.

Usage: ``spark-submit jobs/run_all_tables.py [--quick]``
"""
from __future__ import annotations

import sys
import time

import pandas as pd

from _session import get_spark

from repro.core.features import PAPER_TABLE1, feature_matrix, render_table1
from repro.core.mst import measure_mst
from repro.core.tables import (
    render,
    run_metrics,
    skew_configs,
    skew_frame,
    table23_configs,
    table2_frame,
    table3_frame,
    table4_configs,
    table4_frame,
)


def main() -> None:
    quick = "--quick" in sys.argv
    spark = get_spark("run-all-tables")
    t0 = time.time()

    print(render_table1())
    ok = all(
        bool(feature_matrix().loc[n, f]) == v
        for n, flags in PAPER_TABLE1.items()
        for f, v in flags.items()
    )
    print(f"Table I matches paper: {ok}\n")

    workers = (10,) if quick else (10, 50)
    cfgs23 = table23_configs(workers=workers)
    m23 = run_metrics(cfgs23, spark)
    print(render(table2_frame(spark, m23), "Table II — message overhead ratio"))
    print(render(table3_frame(spark, m23), "Table III — total / invalid checkpoints"))
    print(f"[t23 done at {time.time()-t0:.0f}s]")

    cfgs4 = table4_configs(workers=(5,) if quick else (5, 10))
    m4 = run_metrics(cfgs4, spark)
    print(render(table4_frame(m4), "Table IV — cyclic query (CT/RT/IC)"))
    print(f"[t4 done at {time.time()-t0:.0f}s]")

    rows = []
    for w in workers:
        for q in ("q1", "q3", "q8", "q12"):
            base = measure_mst(q, "none", w)
            for p in ("COOR", "UNC", "CIC"):
                rows.append(dict(query=q, workers=w, protocol=p,
                                 normalized=round(measure_mst(q, p, w) / base, 3)))
    print(render(pd.DataFrame(rows), "Fig. 7 shape — normalized MST"))
    print(f"[mst done at {time.time()-t0:.0f}s]")

    for frac in ((0.5,) if quick else (0.5, 0.8)):
        cfgs_skew = skew_configs(mst_fraction=frac)
        ms = run_metrics(cfgs_skew, spark)
        print(render(skew_frame(ms),
                     f"Fig. 12 shape — skewed NexMark at {int(frac*100)}% MST"))
    print(f"[all done at {time.time()-t0:.0f}s]")

    # figure-shaped extras from the shared grid: restart & recovery times
    cols = ["query", "workers", "protocol", "restart_time", "recovery_time",
            "n_replay", "avg_ckpt_time", "mst", "rate"]
    print(render(
        m23[m23.protocol != "none"][cols].round(4)
        .sort_values(["workers", "query", "protocol"]),
        "Fig. 8/11 shape — checkpoint/restart/recovery times (uniform runs)",
    ))
    spark.stop()


if __name__ == "__main__":
    main()

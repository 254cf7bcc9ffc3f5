"""Reproduce paper Table III: total checkpoints and invalid percentage.

Same grid as Table II (the paper shares those runs too).

Usage: ``spark-submit jobs/table3_invalid.py [--quick]``
"""
from __future__ import annotations

import sys

from _session import get_spark

from repro.core.tables import render, run_metrics, table3_frame, table23_configs


def main() -> None:
    quick = "--quick" in sys.argv
    spark = get_spark("table3-invalid")
    cfgs = (
        table23_configs(workers=(10,), duration=30.0)
        if quick
        else table23_configs(workers=(10, 50))
    )
    metrics = run_metrics(cfgs, spark)
    print(render(table3_frame(spark, metrics), "Table III — total / invalid checkpoints"))
    spark.stop()


if __name__ == "__main__":
    main()

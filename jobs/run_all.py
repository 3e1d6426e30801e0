"""Orchestrator: run every table job once (T1–T11) and print all tables.

The T11 census reuses the sweep rows already produced by T3–T6 instead of
re-running them. Output (stdout) is the source for EXPERIMENTS.md.

Usage: spark-submit jobs/run_all.py [--fast] [--timeout S]
"""
from __future__ import annotations

import time

from _common import get_spark, parse_args

import t1_attrs_global
import t2_attrs_prop
import t3_tau_global
import t4_tau_prop
import t5_krange_global
import t6_krange_prop
import t7_patterns_examined
import t8_shapley
import t9_distributions
import t10_case_study
import t11_result_sizes


def main(spark=None, fast: bool = False, timeout: float = 60.0) -> None:
    spark = spark or get_spark("run_all")
    t0 = time.time()
    sweep_rows: list = []

    def stamp(label):
        print(f"\n[{time.time() - t0:7.1f}s] {label}", flush=True)

    stamp("T1")
    t1_attrs_global.main(spark, fast, timeout)
    stamp("T2")
    t2_attrs_prop.main(spark, fast, timeout)
    stamp("T3")
    for rows in t3_tau_global.main(spark, fast, timeout, "global").values():
        sweep_rows += rows
    stamp("T4")
    for rows in t4_tau_prop.main(spark, fast, timeout).values():
        sweep_rows += rows
    stamp("T5")
    for rows in t5_krange_global.main(spark, fast, timeout, "global").values():
        sweep_rows += rows
    stamp("T6")
    for rows in t6_krange_prop.main(spark, fast, timeout).values():
        sweep_rows += rows
    stamp("T7")
    t7_patterns_examined.main(spark, fast, timeout)
    stamp("T8")
    t8_shapley.main(spark, fast)
    stamp("T9")
    t9_distributions.main(spark, fast)
    stamp("T10")
    t10_case_study.main(spark, fast)
    stamp("T11")
    t11_result_sizes.main(spark, fast, timeout, precomputed_rows=sweep_rows)
    stamp("done")


if __name__ == "__main__":
    args = parse_args(__doc__)
    main(fast=args.fast, timeout=args.timeout)

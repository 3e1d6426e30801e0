"""T9 (paper Fig. 10d–f): value distribution of the attribute with the
largest aggregated Shapley value — top-k tuples vs the detected group —
plus the total-variation distance between the two distributions.

Usage: spark-submit jobs/t9_distributions.py [--fast]
"""
from __future__ import annotations

from _common import emit, get_spark, load_datasets, parse_args
from repro.experiments.shapley_exp import shapley_analysis


def main(spark=None, fast: bool = False, timeout: float = 120.0) -> dict:
    spark = spark or get_spark("t9_distributions")
    out = {}
    n_samples = 8 if fast else 32
    for name, ds in load_datasets(spark, fast).items():
        tau = 50 if not fast else max(5, ds.n // 10)
        a = shapley_analysis(spark, ds, tau=tau, n_samples=n_samples)
        out[name] = a
        attr = a.top6[0][0]
        lines = [
            f"group: {a.group_str}; attribute with largest Shapley: {attr}",
            "",
            "| value | top-k fraction | group fraction |",
            "|---|---|---|",
        ]
        for r in a.distributions.itertuples():
            lines.append(f"| {r.value} | {r.topk_frac:.3f} | {r.group_frac:.3f} |")
        lines.append("")
        lines.append(f"total-variation distance: {a.tv_distance:.3f}")
        emit(f"T9 distributions — {name}", "\n".join(lines))
    return out


if __name__ == "__main__":
    args = parse_args(__doc__)
    main(fast=args.fast)

"""The worst-case construction of Theorem 3.3 / Figure 2.

``n`` binary attributes, ``n+1`` tuples: tuple ``t_i`` (i ≤ n) has
``A_i = 1`` and zeros elsewhere; ``t_{n+1}`` is all zeros. The ranking is
the row order. With ``k_min = k_max = n`` and ``L_k = n/2 + 1`` (global) or
``α = (n+3)/(n+4)`` (proportional), every pattern assigning 0 to exactly
``n/2`` attributes is a most general violating pattern — C(n, n/2) > √2^n
patterns, proving no polynomial enumeration exists."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import RankedDataset


def hardness_construction(
    n: int, spark: SparkSession | None = None
) -> RankedDataset:
    """Build the Figure-2 dataset for ``n`` attributes (``n`` must be even
    for the theorem's parameters to make sense)."""
    if n < 2 or n % 2:
        raise ValueError("n must be an even integer >= 2")
    attrs = [f"A{i}" for i in range(1, n + 1)]
    rows = []
    for i in range(1, n + 2):
        row = {a: "0" for a in attrs}
        if i <= n:
            row[f"A{i}"] = "1"
        row["rank"] = i
        rows.append(row)
    pdf = pd.DataFrame(rows, columns=attrs + ["rank"])
    df = spark.createDataFrame(pdf) if spark is not None else None
    return RankedDataset(
        name=f"hardness(n={n})", pdf=pdf, pattern_attrs=attrs, df=df
    )

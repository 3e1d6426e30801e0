"""The paper's running example: the 16-student table of Figure 1, with the
ranking of the Rank column (grade descending, past failures ascending as the
tiebreak). Used verbatim by the tests that assert Examples 2.3–2.5, 4.6,
4.7 and 4.9."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import RankedDataset

# (Gender, School, Address, Failures, Grade, Rank) — rows 1..16 of Figure 1.
_ROWS = [
    ("F", "MS", "R", 1, 11, 8),
    ("M", "MS", "R", 1, 15, 3),
    ("M", "GP", "U", 1, 8, 10),
    ("M", "GP", "U", 2, 4, 16),
    ("M", "MS", "R", 0, 19, 2),
    ("F", "MS", "U", 1, 4, 15),
    ("F", "GP", "R", 1, 7, 11),
    ("M", "GP", "R", 1, 6, 13),
    ("F", "MS", "R", 0, 14, 4),
    ("F", "MS", "R", 2, 7, 12),
    ("M", "MS", "R", 2, 13, 6),
    ("F", "GP", "U", 0, 20, 1),
    ("F", "GP", "U", 2, 12, 7),
    ("M", "MS", "U", 1, 13, 5),
    ("F", "GP", "U", 1, 5, 14),
    ("M", "GP", "U", 0, 9, 9),
]

PATTERN_ATTRS = ["Gender", "School", "Address", "Failures"]


def paper_example(spark: SparkSession | None = None) -> RankedDataset:
    """The Figure-1 dataset. Pass a SparkSession to attach the Spark
    mirror; omit it for the fast driver-only tests."""
    pdf = pd.DataFrame(
        _ROWS,
        columns=["Gender", "School", "Address", "Failures", "Grade", "rank"],
    )
    pdf.insert(0, "id", range(1, len(pdf) + 1))
    pdf["Failures"] = pdf["Failures"].astype(str)
    df = spark.createDataFrame(pdf) if spark is not None else None
    return RankedDataset(
        name="paper_example",
        pdf=pdf,
        pattern_attrs=PATTERN_ATTRS,
        numeric_cols={"Grade": "Grade"},
        df=df,
    )

"""Spark pattern-statistics store: equivalence with the pandas twin and
with the DuckDB oracle (repro.oracle.assert_equivalent)."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def stores(paper_ds_spark):
    return paper_ds_spark.pandas_store(), paper_ds_spark.spark_store()


@pytest.mark.parametrize(
    "attrs", [(0,), (1,), (3,), (0, 1), (1, 3), (0, 2, 3), (0, 1, 2, 3)]
)
def test_spark_equals_pandas_groups(stores, attrs):
    """Exact equality of the group dicts, rank arrays included."""
    ps, ss = stores
    assert ss.group(attrs) == ps.group(attrs)


def test_spark_domains_and_n(stores):
    ps, ss = stores
    assert ss.n == ps.n == 16
    assert ss.domains == ps.domains


def test_spark_row_at_rank(stores):
    ps, ss = stores
    for k in (1, 5, 16):
        assert ss.row_at_rank(k) == ps.row_at_rank(k)


def test_group_counts_against_duckdb(paper_ds_spark):
    """The aggregation feeding the store, checked by the DuckDB oracle
    (scalar projection: count + rank extrema, arrays are not orderable)."""
    df = paper_ds_spark.df
    agg = df.groupBy("Gender", "School").agg(
        F.count(F.lit(1)).alias("cnt"),
        F.min("rank").alias("min_rank"),
        F.sum("rank").alias("sum_rank"),
    )
    assert_equivalent(
        agg,
        """
        SELECT Gender, School, count(*) AS cnt,
               min(rank) AS min_rank, sum(rank) AS sum_rank
        FROM students GROUP BY Gender, School
        """,
        students=paper_ds_spark.pdf,
    )


def test_topk_counts_against_duckdb(paper_ds_spark):
    """s_{R^5}(p) for every single-attribute pattern vs a DuckDB filter."""
    df = paper_ds_spark.df
    agg = (
        df.where(F.col("rank") <= 5)
        .groupBy("School")
        .agg(F.count(F.lit(1)).alias("topk"))
    )
    assert_equivalent(
        agg,
        "SELECT School, count(*) AS topk FROM students WHERE rank <= 5 GROUP BY School",
        students=paper_ds_spark.pdf,
    )
    store = paper_ds_spark.spark_store()
    for row in agg.collect():
        assert store.topk_count(((1, str(row["School"])),), 5) == row["topk"]


def test_spark_store_on_synthetic_dataset(student_ds):
    """Spark vs pandas store on a real-sized dataset (395 rows, many
    attribute combinations)."""
    ps, ss = student_ds.pandas_store(), student_ds.spark_store()
    for attrs in [(0,), (6,), (0, 1), (1, 3), (0, 1, 2, 3)]:
        assert ss.group(attrs) == ps.group(attrs)
    assert ss.domains == ps.domains


def test_jobs_counter_tracks_cache_misses(paper_ds_spark):
    ss = paper_ds_spark.spark_store()
    assert ss.jobs == 0
    ss.group((0,))
    ss.group((0,))
    ss.group((0, 1))
    assert ss.jobs == 2


class TestPrefetch:
    """The batched GROUPING SETS path must produce byte-identical group
    dicts to per-set aggregation, in a single Spark job."""

    def test_prefetch_matches_per_set(self, paper_ds_spark):
        batched = paper_ds_spark.spark_store()
        sets = [(0,), (1,), (2,), (3,), (0, 1), (0, 3), (1, 2, 3)]
        batched.prefetch(sets)
        assert batched.jobs == 1
        loop = paper_ds_spark.pandas_store()
        for s in sets:
            assert batched.group(s) == loop.group(s)
        assert batched.jobs == 1  # all served from the prefetch

    def test_prefetch_skips_cached_and_empty(self, paper_ds_spark):
        ss = paper_ds_spark.spark_store()
        ss.group((0,))
        jobs = ss.jobs
        ss.prefetch([(), (0,)])
        assert ss.jobs == jobs

    def test_prefetch_single_missing_uses_plain_group(self, paper_ds_spark):
        ss = paper_ds_spark.spark_store()
        ss.prefetch([(2,)])
        assert ss.jobs == 1
        assert ss.group((2,)) == paper_ds_spark.pandas_store().group((2,))

    def test_prefetch_chunking(self, student_ds):
        """More sets than one batch: chunked into several jobs, results
        still correct."""
        from itertools import combinations

        ss = student_ds.spark_store()
        sets = list(combinations(range(8), 2))  # 28 sets
        ss._PREFETCH_CHUNK = 10
        ss.prefetch(sets)
        assert ss.jobs == 3
        ps = student_ds.pandas_store()
        for s in sets[:5]:
            assert ss.group(s) == ps.group(s)

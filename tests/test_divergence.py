"""Tests for the divergence baseline of [27] (Section VI-D comparison)."""
import itertools

import pandas as pd
import pytest

from repro.divergence import divergence_subgroups


def _pandas_reference(pdf, attrs, k, min_support):
    """Driver-side enumeration of all frequent subgroups + divergence."""
    n = len(pdf)
    o_d = k / n
    rows = []
    for r in range(1, len(attrs) + 1):
        for subset in itertools.combinations(range(len(attrs)), r):
            cols = [attrs[i] for i in subset]
            grouped = pdf.groupby(cols, sort=False)
            for key, grp in grouped:
                key = key if isinstance(key, tuple) else (key,)
                if len(grp) < min_support * n:
                    continue
                outcome = float((grp["rank"] <= k).mean())
                rows.append(
                    {
                        "pattern": tuple(
                            (i, str(v)) for i, v in zip(subset, key)
                        ),
                        "size": len(grp),
                        "outcome": outcome,
                        "divergence": outcome - o_d,
                    }
                )
    return rows


@pytest.fixture(scope="module")
def div_result(paper_ds_spark):
    return divergence_subgroups(
        paper_ds_spark.df, paper_ds_spark.pattern_attrs, k=5, min_support=0.2
    )


def test_matches_pandas_reference(paper_ds_spark, div_result):
    ref = _pandas_reference(
        paper_ds_spark.pdf, paper_ds_spark.pattern_attrs, 5, 0.2
    )
    got = {r.pattern: (r.size, r.outcome) for r in div_result.itertuples()}
    exp = {r["pattern"]: (r["size"], r["outcome"]) for r in ref}
    assert got == exp


def test_sorted_most_negative_first(div_result):
    div = div_result["divergence"].to_numpy()
    assert (div[:-1] <= div[1:]).all()


def test_divergence_formula(div_result, paper_ds_spark):
    n = paper_ds_spark.n
    for r in div_result.itertuples():
        assert r.divergence == pytest.approx(r.outcome - 5 / n)


def test_support_threshold_enforced(paper_ds_spark):
    out = divergence_subgroups(
        paper_ds_spark.df, paper_ds_spark.pattern_attrs, k=5, min_support=0.5
    )
    assert (out["size"] >= 8).all()


def test_empty_pattern_excluded(div_result):
    assert all(len(p) >= 1 for p in div_result["pattern"])


def test_bad_support_rejected(paper_ds_spark):
    with pytest.raises(ValueError):
        divergence_subgroups(paper_ds_spark.df, ["Gender"], 5, 0.0)


def test_detected_groups_are_frequent_subgroups(student_ds):
    """§VI-D containment: every pattern our PROPBOUNDS finds (4 attrs,
    τ_s=50, k=10, α=0.8) appears among [27]'s frequent subgroups with
    negative divergence."""
    from repro.core import PropSpec, prop_bounds

    view = student_ds.with_attrs(4)
    store = view.pandas_store()
    res = prop_bounds(store, PropSpec(0.8), 50, 10, 10).res[10]
    assert len(res) >= 1
    div = divergence_subgroups(
        student_ds.df, view.pattern_attrs, k=10, min_support=50 / student_ds.n
    )
    table = {r.pattern: r.divergence for r in div.itertuples()}
    for p in res:
        assert p in table
        assert table[p] < 0

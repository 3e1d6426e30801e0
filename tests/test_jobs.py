"""Smoke tests: every jobs/t*.py entrypoint runs end to end in --fast mode
on the session SparkSession and returns structured results."""
import sys
from pathlib import Path

import pytest

JOBS_DIR = str(Path(__file__).resolve().parent.parent / "jobs")
if JOBS_DIR not in sys.path:
    sys.path.insert(0, JOBS_DIR)


@pytest.fixture(scope="module")
def fast_kwargs():
    return {"fast": True, "timeout": 30.0}


def test_t1_attrs_global(spark, fast_kwargs):
    from t1_attrs_global import main

    out = main(spark, **fast_kwargs)
    assert set(out) == {"student", "compas", "german"}
    for rows in out.values():
        for row in rows:
            if not (row["baseline"].timed_out or row["optimized"].timed_out):
                assert row["baseline"].res == row["optimized"].res


def test_t2_attrs_prop(spark, fast_kwargs):
    from t2_attrs_prop import main

    out = main(spark, **fast_kwargs)
    for rows in out.values():
        for row in rows:
            if not (row["baseline"].timed_out or row["optimized"].timed_out):
                assert row["baseline"].res == row["optimized"].res


def test_t3_tau_global(spark, fast_kwargs):
    from t3_tau_global import main

    out = main(spark, **fast_kwargs)
    assert all(len(rows) == 2 for rows in out.values())


def test_t4_tau_prop(spark, fast_kwargs):
    from t4_tau_prop import main

    out = main(spark, **fast_kwargs)
    assert all(len(rows) == 2 for rows in out.values())


def test_t5_krange_global(spark, fast_kwargs):
    from t5_krange_global import main

    out = main(spark, **fast_kwargs)
    for rows in out.values():
        assert [r["k_max"] for r in rows] == [20, 40]


def test_t6_krange_prop(spark, fast_kwargs):
    from t6_krange_prop import main

    out = main(spark, **fast_kwargs)
    assert len(out) == 3


def test_t7_gains(spark, fast_kwargs):
    from t7_patterns_examined import main

    out = main(spark, **fast_kwargs)
    assert len(out) == 12  # 3 datasets × 2 problems × 2 ranges
    for gain in out.values():
        if gain is not None:
            assert gain < 1.0


def test_t8_shapley(spark):
    from t8_shapley import main

    out = main(spark, fast=True)
    assert set(out) == {"student", "compas", "german"}
    for a in out.values():
        assert len(a.top6) == 6
        assert a.group_size > 0


def test_t9_distributions(spark):
    from t9_distributions import main

    out = main(spark, fast=True)
    for a in out.values():
        assert 0.0 <= a.tv_distance <= 1.0
        assert a.distributions["topk_frac"].sum() == pytest.approx(1.0)


def test_t10_case_study(spark):
    from t10_case_study import main

    out = main(spark, fast=True)
    assert "divergence" in out
    # [27] reports every frequent subgroup, so at least as many groups as
    # either of our most-general result sets.
    assert len(out["divergence"]) >= max(len(out["global"]), len(out["prop"]))


def test_t11_result_sizes(spark, fast_kwargs):
    from t11_result_sizes import main

    census = main(spark, **fast_kwargs)
    assert census["result_sets"] > 0
    assert 0.0 <= census["fraction"] <= 1.0

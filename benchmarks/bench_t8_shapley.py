"""T8 benchmark (Fig. 10): distributed group-Shapley computation — the
mapInPandas + DataFrame-avg pipeline on a detected Student group."""
import numpy as np
import pytest

from repro.shapley import (
    RegressionForest,
    encode_features,
    group_shapley_spark,
)


@pytest.fixture(scope="module")
def fitted_student(student_full):
    X, y, names = encode_features(student_full)
    model = RegressionForest(n_trees=8, max_depth=9, seed=0).fit(X, y)
    return X, names, model


def test_group_shapley_spark(benchmark, spark, student_full, fitted_student):
    X, names, model = fitted_student
    medu = names.index("Medu")
    grp = X[X[:, medu] == 1.0]
    bg = X[np.random.default_rng(0).choice(len(X), 80, replace=False)]

    def target():
        return group_shapley_spark(
            spark, model, grp, bg, names, n_samples=16, seed=0
        )

    shap = benchmark.pedantic(target, rounds=1, iterations=1)
    assert shap.abs().idxmax() == "G3"


def test_forest_fit(benchmark, fitted_student, student_full):
    X, names, _ = fitted_student
    y = student_full.pdf["rank"].to_numpy(dtype="float64")

    def target():
        return RegressionForest(n_trees=8, max_depth=9, seed=0).fit(X, y)

    model = benchmark.pedantic(target, rounds=1, iterations=1)
    assert model.r2(X, y) > 0.9

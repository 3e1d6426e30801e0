"""Tests for the from-scratch CART regression trees and bagged forest."""
import numpy as np
import pytest

from repro.shapley.cart import RegressionForest, RegressionTree, fit_tree


@pytest.fixture(scope="module")
def rng():
    return np.random.default_rng(0)


class TestTree:
    def test_constant_target_single_leaf(self):
        X = np.arange(20, dtype=float).reshape(-1, 1)
        y = np.full(20, 3.5)
        t = fit_tree(X, y)
        assert len(t.feature) == 1
        assert t.feature[0] == -1
        assert t.predict(X) == pytest.approx(np.full(20, 3.5))

    def test_perfect_step_function(self):
        X = np.arange(100, dtype=float).reshape(-1, 1)
        y = (X[:, 0] >= 50).astype(float) * 10
        t = fit_tree(X, y, max_depth=2, min_leaf=1)
        assert t.predict(X) == pytest.approx(y)

    def test_splits_on_informative_feature(self, rng):
        X = rng.normal(size=(300, 3))
        y = 5.0 * X[:, 1]  # only feature 1 matters
        t = fit_tree(X, y, max_depth=6, min_leaf=5)
        assert t.feature[0] == 1

    def test_min_leaf_respected(self, rng):
        X = rng.normal(size=(40, 2))
        y = rng.normal(size=40)
        t = fit_tree(X, y, max_depth=10, min_leaf=10)
        # Count samples reaching each leaf.
        idx = np.zeros(len(X), dtype=np.int64)
        active = t.feature[idx] >= 0
        while active.any():
            node = idx[active]
            go_left = X[active, t.feature[node]] <= t.threshold[node]
            idx[active] = np.where(go_left, t.left[node], t.right[node])
            active = t.feature[idx] >= 0
        _, counts = np.unique(idx, return_counts=True)
        assert (counts >= 10).all()

    def test_piecewise_linear_approximation(self, rng):
        X = rng.uniform(-3, 3, size=(500, 1))
        y = np.sin(X[:, 0])
        t = fit_tree(X, y, max_depth=8, min_leaf=4)
        mse = float(((t.predict(X) - y) ** 2).mean())
        assert mse < 0.01

    def test_predict_matches_manual_traversal(self, rng):
        X = rng.normal(size=(50, 2))
        y = X[:, 0] * 2 + X[:, 1]
        t = fit_tree(X, y, max_depth=4, min_leaf=3)

        def walk(x):
            i = 0
            while t.feature[i] >= 0:
                i = t.left[i] if x[t.feature[i]] <= t.threshold[i] else t.right[i]
            return t.value[i]

        assert t.predict(X) == pytest.approx([walk(x) for x in X])


class TestForest:
    def test_fits_linear_signal(self, rng):
        X = rng.normal(size=(600, 4))
        y = 3 * X[:, 0] - 2 * X[:, 2] + rng.normal(0, 0.1, 600)
        f = RegressionForest(n_trees=8, max_depth=8, seed=1).fit(X, y)
        assert f.r2(X, y) > 0.9

    def test_deterministic_given_seed(self, rng):
        X = rng.normal(size=(100, 3))
        y = X[:, 0] + rng.normal(0, 0.2, 100)
        a = RegressionForest(n_trees=4, seed=7).fit(X, y).predict(X)
        b = RegressionForest(n_trees=4, seed=7).fit(X, y).predict(X)
        assert a == pytest.approx(b)

    def test_predict_is_tree_average(self, rng):
        X = rng.normal(size=(80, 2))
        y = X[:, 0] ** 2
        f = RegressionForest(n_trees=3, seed=3).fit(X, y)
        manual = np.mean([t.predict(X) for t in f.trees], axis=0)
        assert f.predict(X) == pytest.approx(manual)

    def test_picklable_for_spark_closures(self, rng):
        import pickle

        X = rng.normal(size=(60, 2))
        y = X[:, 1]
        f = RegressionForest(n_trees=2, seed=0).fit(X, y)
        g = pickle.loads(pickle.dumps(f))
        assert g.predict(X) == pytest.approx(f.predict(X))

    def test_rank_surrogate_on_student(self, student_ds):
        """M_R must simulate the ranker well (the paper's premise for the
        Shapley analysis): rank is a monotone function of G3."""
        from repro.shapley.encode import encode_features

        X, y, names = encode_features(student_ds)
        f = RegressionForest(n_trees=6, max_depth=9, seed=0).fit(X, y)
        assert f.r2(X, y) > 0.95

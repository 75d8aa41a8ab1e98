"""Minimal logistic regression: convergence and calibration."""
import numpy as np
import pytest

from repro.ml.logreg import LogisticRegression


def _separable(n=200, seed=0):
    rng = np.random.default_rng(seed)
    X0 = rng.normal(-1.5, 1.0, size=(n // 2, 2))
    X1 = rng.normal(1.5, 1.0, size=(n // 2, 2))
    X = np.vstack([X0, X1])
    y = np.concatenate([np.zeros(n // 2), np.ones(n // 2)])
    return X, y


class TestFit:
    def test_accuracy_on_separable(self):
        X, y = _separable()
        m = LogisticRegression().fit(X, y)
        assert m.accuracy(X, y) > 0.9

    def test_coefficient_signs(self):
        X, y = _separable()
        m = LogisticRegression().fit(X, y)
        assert np.all(m.coef_ > 0)  # positive class has larger features

    def test_negated_feature_flips_sign(self):
        X, y = _separable()
        X2 = X.copy()
        X2[:, 0] = -X2[:, 0]
        m = LogisticRegression().fit(X2, y)
        assert m.coef_[0] < 0 and m.coef_[1] > 0

    def test_probabilities_in_unit_interval(self):
        X, y = _separable()
        m = LogisticRegression().fit(X, y)
        p = m.predict_proba(X)
        assert np.all((p >= 0) & (p <= 1))

    def test_probability_ordering(self):
        X, y = _separable()
        m = LogisticRegression().fit(X, y)
        assert m.predict_proba(np.array([[3.0, 3.0]]))[0] > m.predict_proba(
            np.array([[-3.0, -3.0]])
        )[0]

    def test_constant_feature_handled(self):
        X, y = _separable()
        X = np.hstack([X, np.ones((len(X), 1))])
        m = LogisticRegression().fit(X, y)
        assert m.accuracy(X, y) > 0.9

    def test_deterministic(self):
        X, y = _separable()
        m1 = LogisticRegression().fit(X, y)
        m2 = LogisticRegression().fit(X, y)
        assert np.allclose(m1.coef_, m2.coef_)

    def test_rejects_non_binary_labels(self):
        with pytest.raises(ValueError):
            LogisticRegression().fit(np.zeros((3, 1)), np.array([0, 1, 2]))

    def test_rejects_shape_mismatch(self):
        with pytest.raises(ValueError):
            LogisticRegression().fit(np.zeros((3, 1)), np.array([0, 1]))

    def test_imbalanced_still_learns(self):
        rng = np.random.default_rng(1)
        X0 = rng.normal(-1, 1, size=(180, 1))
        X1 = rng.normal(2, 1, size=(20, 1))
        X = np.vstack([X0, X1])
        y = np.concatenate([np.zeros(180), np.ones(20)])
        m = LogisticRegression().fit(X, y)
        assert m.accuracy(X, y) > 0.85

    def test_predict_binary(self):
        X, y = _separable()
        m = LogisticRegression().fit(X, y)
        assert set(np.unique(m.predict(X))) <= {0, 1}

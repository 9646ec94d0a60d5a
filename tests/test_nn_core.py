"""Tests for the numpy MLP used by the simulated neural matchers."""
import numpy as np
import pytest

from repro.matchers.neural.nn_core import MLP


def _linear_task(n=600, seed=0):
    g = np.random.default_rng(seed)
    X = g.standard_normal((n, 6))
    y = (X[:, 0] + 0.5 * X[:, 1] > 0).astype(float)
    return X, y


def test_learns_linear_boundary():
    X, y = _linear_task()
    m = MLP(6, (16,), epochs=25, seed=1).fit(X, y)
    assert ((m.predict(X) > 0.5) == y).mean() > 0.93


def test_learns_nonlinear_boundary():
    g = np.random.default_rng(3)
    X = g.standard_normal((800, 2))
    y = ((X[:, 0] * X[:, 1]) > 0).astype(float)  # XOR-ish quadrants
    m = MLP(2, (32, 16), epochs=60, seed=2).fit(X, y)
    assert ((m.predict(X) > 0.5) == y).mean() > 0.9


def test_predictions_in_unit_interval():
    X, y = _linear_task()
    m = MLP(6, (8,), epochs=5).fit(X, y)
    p = m.predict(X * 100)
    assert np.all(p >= 0) and np.all(p <= 1)


def test_deterministic_given_seed():
    X, y = _linear_task()
    p1 = MLP(6, (8,), epochs=5, seed=7).fit(X, y).predict(X)
    p2 = MLP(6, (8,), epochs=5, seed=7).fit(X, y).predict(X)
    np.testing.assert_allclose(p1, p2)


def test_seed_changes_model():
    X, y = _linear_task()
    p1 = MLP(6, (8,), epochs=5, seed=1).fit(X, y).predict(X)
    p2 = MLP(6, (8,), epochs=5, seed=2).fit(X, y).predict(X)
    assert not np.allclose(p1, p2)


def test_pos_weight_raises_recall_on_imbalanced():
    g = np.random.default_rng(5)
    n_pos, n_neg = 25, 975
    X = np.concatenate([
        g.standard_normal((n_pos, 4)) + 1.2,
        g.standard_normal((n_neg, 4)) - 0.2,
    ])
    y = np.concatenate([np.ones(n_pos), np.zeros(n_neg)])
    heavy = MLP(4, (8,), epochs=25, seed=3).fit(X, y, pos_weight=40.0)
    light = MLP(4, (8,), epochs=25, seed=3).fit(X, y, pos_weight=1.0)
    rec_heavy = (heavy.predict(X[:n_pos]) > 0.5).mean()
    rec_light = (light.predict(X[:n_pos]) > 0.5).mean()
    assert rec_heavy >= rec_light


def test_constant_feature_does_not_crash():
    X, y = _linear_task()
    X = np.concatenate([X, np.ones((len(X), 1))], axis=1)
    m = MLP(7, (8,), epochs=3).fit(X, y)
    assert np.isfinite(m.predict(X)).all()


def test_standardization_stored():
    X, y = _linear_task()
    m = MLP(6, (8,), epochs=2).fit(X * 10 + 5, y)
    assert m.mu == pytest.approx(np.full(6, 5.0), abs=1.5)

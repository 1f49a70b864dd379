"""Unit tests for random forest and FastTree (MART gradient boosting)."""
import numpy as np
import pytest

from repro.core.learners import FastTreeRegressor, RandomForestRegressor
from repro.metrics import median_error_pct, pearson


def test_fasttree_fits(loglinear_data):
    X, y = loglinear_data
    m = FastTreeRegressor().fit(X[:800], y[:800])
    assert median_error_pct(m.predict(X[800:]), y[800:]) < 60
    assert pearson(m.predict(X[800:]), y[800:]) > 0.7


def test_fasttree_residual_fitting_improves_with_stages(loglinear_data):
    X, y = loglinear_data
    few = FastTreeRegressor(n_estimators=1).fit(X, y)
    many = FastTreeRegressor(n_estimators=20).fit(X, y)
    assert median_error_pct(many.predict(X), y) < median_error_pct(few.predict(X), y)


def test_fasttree_paper_hyperparams():
    m = FastTreeRegressor()
    assert m.n_estimators == 20 and m.max_depth == 5 and m.subsample == 0.9


def test_fasttree_deterministic(loglinear_data):
    X, y = loglinear_data
    p1 = FastTreeRegressor(seed=3).fit(X, y).predict(X)
    p2 = FastTreeRegressor(seed=3).fit(X, y).predict(X)
    assert np.array_equal(p1, p2)


def test_fasttree_seed_changes_subsamples(loglinear_data):
    X, y = loglinear_data
    p1 = FastTreeRegressor(seed=1).fit(X, y).predict(X)
    p2 = FastTreeRegressor(seed=2).fit(X, y).predict(X)
    assert not np.array_equal(p1, p2)


def test_fasttree_predict_log_consistent(loglinear_data):
    X, y = loglinear_data
    m = FastTreeRegressor().fit(X, y)
    assert np.allclose(np.expm1(m.predict_log(X)), m.predict(X), rtol=1e-9)


def test_forest_fits(loglinear_data):
    X, y = loglinear_data
    m = RandomForestRegressor().fit(X[:800], y[:800])
    assert pearson(m.predict(X[800:]), y[800:]) > 0.6


def test_forest_paper_hyperparams():
    m = RandomForestRegressor()
    assert m.n_estimators == 20 and m.max_depth == 5


def test_forest_averaging_smooths(loglinear_data):
    X, y = loglinear_data
    single = RandomForestRegressor(n_estimators=1).fit(X, y)
    full = RandomForestRegressor(n_estimators=20).fit(X, y)
    # Ensemble should not be worse than a single bagged tree.
    assert median_error_pct(full.predict(X), y) <= median_error_pct(
        single.predict(X), y
    ) * 1.5


def test_forest_positive_predictions(loglinear_data):
    X, y = loglinear_data
    m = RandomForestRegressor().fit(X, y)
    assert (m.predict(X) >= 0).all()


@pytest.mark.parametrize("cls", [FastTreeRegressor, RandomForestRegressor])
def test_ensembles_handle_tiny_data(cls):
    X = np.random.default_rng(0).random((4, 3))
    y = np.array([1.0, 2.0, 3.0, 4.0])
    m = cls().fit(X, y)
    assert np.isfinite(m.predict(X)).all()

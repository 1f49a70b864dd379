"""Tests for the model families + Spark-parallel training (§3-§5.1)."""
import numpy as np
import pytest

from repro.core.models import (
    FAMILIES,
    FAMILY_BY_NAME,
    MIN_OCCURRENCES,
    train_bank,
    train_family_pandas,
    train_family_spark,
)
from repro.metrics import median_error_pct


def test_family_specs():
    names = [f.name for f in FAMILIES]
    assert names == ["Op-Subgraph", "Op-SubgraphApprox", "Op-Input", "Operator"]
    assert FAMILY_BY_NAME["Operator"].min_occurrences == 1
    assert FAMILY_BY_NAME["Op-Subgraph"].min_occurrences == MIN_OCCURRENCES


def test_min_occurrences_threshold(tiny, tiny_bank):
    _, ops, _ = tiny
    train = ops[ops.day <= 2]
    counts = train.groupby("sig_sub").size()
    modeled = set(tiny_bank.models["Op-Subgraph"])
    for sig, cnt in counts.items():
        if cnt >= MIN_OCCURRENCES:
            assert sig in modeled
        else:
            assert sig not in modeled


def test_operator_family_full_coverage(tiny, tiny_bank):
    _, ops, _ = tiny
    ops_in_train = set(ops[ops.day <= 2].op)
    assert ops_in_train == set(tiny_bank.models["Operator"])


def test_coverage_ladder(tiny, tiny_bank):
    """Specialized -> general must increase coverage (§4.2, Table 5)."""
    _, ops, _ = tiny
    test = ops[ops.day == 3]
    cov = []
    for spec in FAMILIES:
        pred = tiny_bank.predict_family(spec.name, test)
        cov.append(np.mean(~np.isnan(pred)))
    assert cov[0] <= cov[1] + 0.02
    assert cov[1] <= cov[2] + 0.02
    assert cov[3] == 1.0


def test_accuracy_better_than_default(tiny, tiny_bank):
    _, ops, _ = tiny
    test = ops[ops.day == 3]
    pred = tiny_bank.predict_family("Op-Subgraph", test)
    m = ~np.isnan(pred)
    a = test.actual.to_numpy()
    assert median_error_pct(pred[m], a[m]) < median_error_pct(
        test.cost_default.to_numpy()[m], a[m]
    )


def test_predict_all_columns(tiny, tiny_bank):
    _, ops, _ = tiny
    scored = tiny_bank.predict_all(ops[ops.day == 3].head(50))
    for spec in FAMILIES:
        assert f"pred_{spec.key_col}" in scored.columns


def test_pandas_predictions_deterministic(tiny, tiny_bank):
    _, ops, _ = tiny
    test = ops[ops.day == 3].head(100)
    p1 = tiny_bank.predict_family("Op-Input", test)
    p2 = tiny_bank.predict_family("Op-Input", test)
    assert np.array_equal(p1, p2, equal_nan=True)


def test_spark_training_matches_pandas(spark, tiny):
    """The Spark-parallel trainer must produce the same models as the
    driver-side trainer (same groups, same elastic-net fits)."""
    _, ops, _ = tiny
    train = ops[ops.day == 1]
    spec = FAMILY_BY_NAME["Op-Input"]
    local = train_family_pandas(train, spec)
    sdf = spark.createDataFrame(
        train[["I", "B", "C", "L", "P", "in_hash", "pm", "cl", "depth", "actual",
               "sig_sub", "sig_approx", "sig_opinput", "op"]]
    )
    dist = train_family_spark(sdf, spec)
    assert set(local) == set(dist)
    for key in list(local)[:20]:
        assert np.allclose(local[key].raw_coef, dist[key].raw_coef, atol=1e-8)
        assert local[key].raw_intercept == pytest.approx(dist[key].raw_intercept)
        assert local[key].n_train == dist[key].n_train


def test_train_bank_spark_end_to_end(spark, tiny):
    _, ops, _ = tiny
    bank = train_bank(ops[ops.day == 1].head(400), spark=spark)
    assert bank.n_models("Operator") > 0
    test = ops[ops.day == 3].head(50)
    pred = bank.predict_family("Operator", test)
    assert np.isfinite(pred[~np.isnan(pred)]).all()


def test_linear_model_predict_clip(tiny_bank):
    any_model = next(iter(tiny_bank.models["Operator"].values()))
    X = np.full((3, len(any_model.raw_coef)), 1e12)
    pred = any_model.predict(X)
    assert (pred <= np.expm1(any_model.z_hi) + 1).all()

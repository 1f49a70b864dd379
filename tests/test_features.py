"""Tests for the Table 2/3 feature layer: pandas/numpy vs Spark vs
DuckDB equivalence, and the §5.3 partition-theta extraction."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core import features
from repro.core.learners.linear import ElasticNet


def _log_frame(n=200, seed=0):
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "I": np.exp(g.normal(10, 2, n)),
            "B": np.exp(g.normal(11, 2, n)),
            "C": np.exp(g.normal(8, 2, n)),
            "L": g.uniform(40, 400, n),
            "P": g.integers(1, 500, n).astype(float),
            "in_hash": g.random(n),
            "pm": g.random(n),
            "cl": g.integers(1, 30, n).astype(float),
            "depth": g.integers(1, 12, n).astype(float),
        }
    )


def test_feature_names_counts():
    # 27 candidate features (paper: "25 to 30"), +2 context features.
    assert len(features.FEATURE_NAMES) == 27
    assert features.ALL_FEATURE_NAMES[-2:] == ["f_CL", "f_D"]


def test_feature_matrix_shape():
    pdf = _log_frame()
    assert features.feature_matrix(pdf).shape == (200, 27)
    assert features.feature_matrix(pdf, context=True).shape == (200, 29)


def test_feature_matrix_finite():
    pdf = _log_frame()
    pdf.loc[0, "I"] = 0.0
    pdf.loc[1, "C"] = 1.0
    assert np.isfinite(features.feature_matrix(pdf, context=True)).all()


def test_basic_features_are_identity():
    pdf = _log_frame(20)
    X = features.feature_matrix(pdf)
    assert np.allclose(X[:, 0], pdf["I"])
    assert np.allclose(X[:, 4], pdf["P"])
    assert np.allclose(X[:, 6], pdf["pm"])


def test_derived_feature_formulas_spotcheck():
    pdf = _log_frame(10)
    X = features.feature_matrix(pdf)
    names = features.FEATURE_NAMES
    assert np.allclose(X[:, names.index("f_IL_P")], pdf.I * pdf.L / pdf.P)
    assert np.allclose(X[:, names.index("f_logIlogC")],
                       np.log1p(pdf.I) * np.log1p(pdf.C))
    assert np.allclose(X[:, names.index("f_sqrtB")], np.sqrt(pdf.B))


def test_spark_features_match_pandas(spark):
    pdf = _log_frame(100, seed=3)
    sdf = features.with_spark_features(spark.createDataFrame(pdf), context=True)
    got = sdf.toPandas()
    X = features.feature_matrix(pdf, context=True)
    for j, name in enumerate(features.ALL_FEATURE_NAMES):
        assert np.allclose(got[name].to_numpy(), X[:, j], rtol=1e-9), name


def test_spark_features_match_duckdb_oracle(spark):
    """The Catalyst feature expressions equal the same SQL on DuckDB."""
    from repro.oracle import assert_equivalent

    pdf = _log_frame(80, seed=4).round(6)
    pdf["rid"] = np.arange(len(pdf))
    sdf = features.with_spark_features(spark.createDataFrame(pdf))
    sel = ["rid", "f_sqrtI", "f_LI", "f_BC", "f_I_P", "f_logI_P"]
    sql = """
        SELECT rid, sqrt(I) AS f_sqrtI, L * I AS f_LI, B * C AS f_BC,
               I / P AS f_I_P, ln(1 + I) / P AS f_logI_P
        FROM t
    """
    assert_equivalent(sdf.select(*sel), sql, t=pdf)


def test_partition_thetas_from_known_weights():
    # Craft raw weights: only I*L/P and P non-zero.
    coef = np.zeros(len(features.FEATURE_NAMES))
    coef[features.FEATURE_NAMES.index("f_IL_P")] = 2.0
    coef[features.P_FEATURE_INDEX] = 0.5
    tp, tc = features.partition_thetas(coef, i_card=10.0, c_card=3.0, row_len=4.0)
    assert tp == pytest.approx(2.0 * 10 * 4)
    assert tc == pytest.approx(0.5)


def test_partition_thetas_all_inverse_features():
    coef = np.ones(len(features.FEATURE_NAMES))
    i, c, ln = 100.0, 50.0, 10.0
    tp, _ = features.partition_thetas(coef, i, c, ln)
    expected = (
        i + c + i * ln + c * ln + np.sqrt(i) + np.sqrt(c) + np.log1p(i)
    )
    assert tp == pytest.approx(expected)


def test_learned_thetas_recover_partition_response():
    """Fit on data with a genuine work/P + gamma*P response; the §5.3
    analytical optimum from the learned weights should land near the
    true optimum."""
    g = np.random.default_rng(5)
    n = 400
    pdf = _log_frame(n, seed=5)
    pdf["I"] = 1e6 * np.exp(g.normal(0, 0.2, n))
    pdf["C"] = pdf["I"] * 0.3
    pdf["L"] = 100.0
    pdf["P"] = np.exp(g.normal(np.log(60), 0.5, n)).round().clip(1)
    work = pdf.I * pdf.L / 1e7
    y = work / pdf.P + 0.03 * pdf.P
    en = ElasticNet(alpha=0.05).fit(features.feature_matrix(pdf), y.to_numpy())
    tp, tc = features.partition_thetas(
        en.raw_coef_, float(pdf.I.mean()), float(pdf.C.mean()), 100.0
    )
    assert tp > 0 and tc > 0
    p_star = np.sqrt(tp / tc)
    true_opt = np.sqrt((pdf.I.mean() * 100 / 1e7) / 0.03)
    assert 0.2 * true_opt < p_star < 5 * true_opt


def test_feature_names_context_flag():
    assert features.feature_names(False) == features.FEATURE_NAMES
    assert features.feature_names(True) == features.ALL_FEATURE_NAMES

"""Accuracy metrics used throughout the paper's evaluation (§6).

The paper reports, for a set of (predicted cost, actual runtime) pairs:

- **median error**: median of ``|pred - actual| / actual`` as a percent
  (e.g. "14%" for the operator-subgraph model, "258%" for the default
  cost model in Table 4/5);
- **95%tile error**: the 95th percentile of the same ratio (Table 7);
- **Pearson correlation** between predicted and actual (raw scale);
- **coverage**: fraction of operator instances for which a model family
  has a trained model (Table 5/7).

Both local (numpy/pandas) and Spark implementations are provided; the
Spark versions aggregate with Catalyst (``percentile_approx``, ``corr``)
so metric computation itself scales with the workload DataFrame.
"""
from __future__ import annotations

import math

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_EPS = 1e-9


def relative_errors(pred: np.ndarray, actual: np.ndarray) -> np.ndarray:
    """``|pred - actual| / actual`` per element (unitless, 1.0 == 100%)."""
    pred = np.asarray(pred, dtype=float)
    actual = np.asarray(actual, dtype=float)
    return np.abs(pred - actual) / np.maximum(actual, _EPS)


def median_error_pct(pred: np.ndarray, actual: np.ndarray) -> float:
    """Median relative error in percent, as reported in Tables 1, 4-8."""
    if len(np.asarray(pred)) == 0:
        return float("nan")
    return float(np.median(relative_errors(pred, actual)) * 100.0)


def p95_error_pct(pred: np.ndarray, actual: np.ndarray) -> float:
    """95th-percentile relative error in percent (Table 7)."""
    if len(np.asarray(pred)) == 0:
        return float("nan")
    return float(np.percentile(relative_errors(pred, actual), 95) * 100.0)


def pearson(pred: np.ndarray, actual: np.ndarray) -> float:
    """Pearson correlation on the raw (not log) scale, as in the paper."""
    pred = np.asarray(pred, dtype=float)
    actual = np.asarray(actual, dtype=float)
    if len(pred) < 2 or np.std(pred) < _EPS or np.std(actual) < _EPS:
        return float("nan")
    return float(np.corrcoef(pred, actual)[0, 1])


def summarize(pred: np.ndarray, actual: np.ndarray) -> dict:
    """One row of a paper table: correlation, median and 95%ile error."""
    return {
        "correlation": pearson(pred, actual),
        "median_error_pct": median_error_pct(pred, actual),
        "p95_error_pct": p95_error_pct(pred, actual),
        "n": int(len(np.asarray(pred))),
    }


# --------------------------------------------------------------------------
# Spark-side equivalents
# --------------------------------------------------------------------------

def spark_summarize(df: DataFrame, pred_col: str, actual_col: str) -> dict:
    """Same as :func:`summarize` but aggregated by Catalyst.

    Rows where ``pred_col`` is null (model does not cover the instance)
    are excluded from the error metrics; ``coverage`` reports their
    fraction.
    """
    err = F.abs(F.col(pred_col) - F.col(actual_col)) / F.greatest(
        F.col(actual_col), F.lit(_EPS)
    )
    covered = df.filter(F.col(pred_col).isNotNull())
    row = covered.agg(
        F.corr(pred_col, actual_col).alias("correlation"),
        F.percentile_approx(err, 0.5, 10000).alias("med"),
        F.percentile_approx(err, 0.95, 10000).alias("p95"),
        F.count(F.lit(1)).alias("n_covered"),
    ).collect()[0]
    n_total = df.count()
    return {
        "correlation": None if row["correlation"] is None else float(row["correlation"]),
        "median_error_pct": None if row["med"] is None else float(row["med"] * 100),
        "p95_error_pct": None if row["p95"] is None else float(row["p95"] * 100),
        "coverage_pct": 100.0 * row["n_covered"] / max(n_total, 1),
        "n": n_total,
    }


def fmt_table(rows: list[dict], columns: list[str] | None = None) -> str:
    """Render experiment rows as a GitHub-markdown table for EXPERIMENTS.md."""
    pdf = pd.DataFrame(rows)
    if columns:
        pdf = pdf[columns]

    def _fmt(v):
        if isinstance(v, float):
            if math.isnan(v):
                return "-"
            return f"{v:.2f}" if abs(v) < 10 else f"{v:.0f}"
        return str(v)

    header = "| " + " | ".join(pdf.columns) + " |"
    sep = "|" + "|".join(["---"] * len(pdf.columns)) + "|"
    body = "\n".join(
        "| " + " | ".join(_fmt(v) for v in rec) + " |" for rec in pdf.itertuples(index=False)
    )
    return "\n".join([header, sep, body])

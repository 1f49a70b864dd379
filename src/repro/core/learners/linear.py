"""Linear cost models: elastic net (the paper's default) and a
pluggable-loss gradient-descent variant for the Table 1 comparison.

The paper's elastic net (§3.2-3.4) minimizes mean-squared *log* error
``mean((log(p+1) - log(a+1))^2)``; the log transform "implicitly ensures
that the predicted costs are always positive". We therefore fit a linear
model in log space — ``log1p(cost) = w·x + b`` — by coordinate descent
with the standard elastic-net penalty, and predict ``expm1(w·x + b)``
clipped at 0. Features are standardized internally; learned weights are
exposed both in standardized space (``coef_``) and raw-feature space
(``raw_coef_``, used by the analytical partition exploration of §5.3).
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-12


def _standardize(X: np.ndarray):
    mu = X.mean(axis=0)
    sd = X.std(axis=0)
    sd = np.where(sd < _EPS, 1.0, sd)
    return (X - mu) / sd, mu, sd


class ElasticNet:
    """L1+L2-regularized linear regression on the log1p-transformed target.

    Parameters mirror the paper (§3.4): ``alpha=1.0``, ``l1_ratio=0.5``,
    ``fit_intercept=True``. ``alpha`` here is scaled by a factor chosen
    for standardized features and a log-scale target (the paper's scale
    is not published); the default keeps a handful of non-zero weights
    per small training group, which is the behaviour §3.4 describes
    ("automatic feature selection").
    """

    def __init__(
        self,
        alpha: float = 1.0,
        l1_ratio: float = 0.5,
        fit_intercept: bool = True,
        max_iter: int = 300,
        tol: float = 1e-6,
        alpha_scale: float = 0.02,
        log_target: bool = True,
    ):
        self.alpha = alpha * alpha_scale
        self.l1_ratio = l1_ratio
        self.fit_intercept = fit_intercept
        self.max_iter = max_iter
        self.tol = tol
        self.log_target = log_target

    def fit(self, X: np.ndarray, y: np.ndarray) -> "ElasticNet":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float)
        t = np.log1p(np.maximum(y, 0.0)) if self.log_target else y
        Xs, self.mu_, self.sd_ = _standardize(X)
        n, d = Xs.shape
        self.intercept_ = float(t.mean()) if self.fit_intercept else 0.0
        r = t - self.intercept_
        w = np.zeros(d)
        l1 = self.alpha * self.l1_ratio
        l2 = self.alpha * (1.0 - self.l1_ratio)
        # Precompute column norms; coordinate descent on the standard
        # objective 1/(2n)||t - Xw||^2 + l1||w||_1 + l2/2 ||w||^2.
        col_sq = (Xs * Xs).sum(axis=0) / n
        for _ in range(self.max_iter):
            max_delta = 0.0
            for j in range(d):
                if col_sq[j] < _EPS:
                    continue
                rho = (Xs[:, j] @ r) / n + col_sq[j] * w[j]
                wj = np.sign(rho) * max(abs(rho) - l1, 0.0) / (col_sq[j] + l2)
                delta = wj - w[j]
                if delta != 0.0:
                    r -= delta * Xs[:, j]
                    max_delta = max(max_delta, abs(delta))
                    w[j] = wj
            if self.fit_intercept:
                shift = r.mean()
                self.intercept_ += shift
                r -= shift
            if max_delta < self.tol:
                break
        self.coef_ = w
        # Weights applicable to raw (unstandardized) features:
        #   t = intercept + sum_j coef_j * (x_j - mu_j)/sd_j
        #     = raw_intercept + sum_j raw_coef_j * x_j
        self.raw_coef_ = w / self.sd_
        self.raw_intercept_ = self.intercept_ - float((w * self.mu_ / self.sd_).sum())
        # Extrapolation guard: a linear model in log space explodes
        # multiplicatively outside the training envelope, so clip
        # predictions to the observed target range plus headroom.
        self.z_lo_, self.z_hi_ = float(t.min()) - 0.7, float(t.max()) + 0.7
        return self

    def predict_log(self, X: np.ndarray) -> np.ndarray:
        """Prediction in log1p space (the model's native space)."""
        X = np.asarray(X, dtype=float)
        z = X @ self.raw_coef_ + self.raw_intercept_
        return np.clip(z, self.z_lo_, self.z_hi_)

    def predict(self, X: np.ndarray) -> np.ndarray:
        z = self.predict_log(X)
        if not self.log_target:
            return z
        return np.expm1(np.clip(z, -30.0, 30.0))


class GDLinear:
    """Linear model in log space trained with a pluggable loss (Table 1).

    The prediction is always ``expm1(w·x + b)``; the *loss* compares
    prediction and actual on the scale the loss dictates:

    - ``msle``: mean squared error in log space (the paper's choice) —
      equivalent to :class:`ElasticNet` without penalty;
    - ``mse``: mean squared error on the raw scale;
    - ``mae``: mean absolute error on the raw scale;
    - ``medae``: median absolute error on the raw scale, optimized via
      an iteratively-reweighted scheme concentrating weight around the
      current median residual.

    Trained with Adam on standardized features.
    """

    def __init__(self, loss: str = "msle", lr: float = 0.05, epochs: int = 400, l2: float = 1e-4):
        if loss not in ("msle", "mse", "mae", "medae"):
            raise ValueError(f"unknown loss {loss!r}")
        self.loss = loss
        self.lr = lr
        self.epochs = epochs
        self.l2 = l2

    def _raw_pred(self, Xs, w, b):
        return np.expm1(np.clip(Xs @ w + b, -30.0, 30.0))

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GDLinear":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float)
        Xs, self.mu_, self.sd_ = _standardize(X)
        n, d = Xs.shape
        t = np.log1p(np.maximum(y, 0.0))
        w = np.zeros(d)
        b = float(t.mean())
        m = np.zeros(d + 1)
        v = np.zeros(d + 1)
        b1, b2, eps = 0.9, 0.999, 1e-8
        # Scale raw-space losses so gradients are comparable across
        # workloads with very different cost magnitudes.
        y_scale = max(float(np.mean(y)), 1.0)
        for it in range(1, self.epochs + 1):
            z = np.clip(Xs @ w + b, -30.0, 30.0)
            if self.loss == "msle":
                # d/dz mean (z - t)^2
                gz = 2.0 * (z - t) / n
            else:
                p = np.expm1(z)
                res = (p - y) / y_scale
                if self.loss == "mse":
                    gl = 2.0 * res / n
                elif self.loss == "mae":
                    gl = np.sign(res) / n
                else:  # medae: weight residuals near the median |res|
                    a = np.abs(res)
                    med = np.median(a)
                    band = 0.5 * med + 1e-9
                    wts = np.exp(-((a - med) ** 2) / (2 * band**2))
                    wts /= wts.sum() + 1e-12
                    gl = np.sign(res) * wts
                # chain rule through p = expm1(z): dp/dz = exp(z)
                gz = gl * np.exp(z) / y_scale
            gw = Xs.T @ gz + self.l2 * w
            gb = float(gz.sum())
            g = np.concatenate([gw, [gb]])
            m = b1 * m + (1 - b1) * g
            v = b2 * v + (1 - b2) * g * g
            mh = m / (1 - b1**it)
            vh = v / (1 - b2**it)
            step = self.lr * mh / (np.sqrt(vh) + eps)
            w -= step[:d]
            b -= step[d]
        self.coef_ = w
        self.intercept_ = b
        self.z_lo_, self.z_hi_ = float(t.min()) - 0.7, float(t.max()) + 0.7
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        Xs = (X - self.mu_) / self.sd_
        z = np.clip(Xs @ self.coef_ + self.intercept_, self.z_lo_, self.z_hi_)
        return np.expm1(np.clip(z, -30.0, 30.0))

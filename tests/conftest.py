"""Shared fixtures for the test suite: tiny workloads and trained banks
(session-scoped — generation and training are deterministic)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.combined import CombinedModel
from repro.core.models import train_bank
from repro.scope.workload import Cluster, tiny_cluster


@pytest.fixture(scope="session")
def tiny():
    """A tiny cluster with 3 generated days: (cluster, ops_df, jobs_df)."""
    cl = Cluster(tiny_cluster())
    ops, jobs = cl.generate_days([1, 2, 3])
    return cl, ops, jobs


@pytest.fixture(scope="session")
def tiny_bank(tiny):
    """ModelBank trained driver-side on tiny days 1-2."""
    _, ops, _ = tiny
    return train_bank(ops[ops.day <= 2], spark=None)


@pytest.fixture(scope="session")
def tiny_combined(tiny, tiny_bank):
    _, ops, _ = tiny
    return CombinedModel().fit(tiny_bank, ops[ops.day == 2])


@pytest.fixture()
def rng():
    return np.random.default_rng(0)


@pytest.fixture(scope="session")
def loglinear_data():
    """Synthetic data where log1p(y) is exactly linear in X plus noise —
    the regime every learner should fit well."""
    g = np.random.default_rng(42)
    n, d = 1200, 8
    X = g.random((n, d)) * 5
    w = g.normal(0, 0.3, d)
    z = X @ w + 2.0 + g.normal(0, 0.05, n)
    y = np.expm1(np.clip(z, -5, 12))
    return X, y

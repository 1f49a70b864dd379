"""Tests for the Figure 15 cardinality-study helpers."""
import numpy as np

from repro.experiments.fig15 import PAPER, _with_true_cards


def test_with_true_cards_swaps_features(tiny):
    _, ops, _ = tiny
    out = _with_true_cards(ops.head(100))
    assert np.allclose(out["I"], ops.head(100)["true_I"])
    assert np.allclose(out["C"], ops.head(100)["true_C"])
    # Originals untouched.
    assert not np.allclose(ops.head(100)["I"], ops.head(100)["true_I"])


def test_paper_reference_shape():
    assert PAPER["CLEO"][1] < PAPER["Default + CardLearner"][1] / 5
    assert PAPER["CLEO + CardLearner"][1] <= PAPER["CLEO"][1]

"""Tests for the hand-crafted default/tuned cost models (§2.4)."""
import numpy as np

from repro.metrics import summarize
from repro.scope import default_cost as dc


def test_hand_coeffs_cached_and_deterministic():
    a = dc._hand_coeffs("c1", "HashJoin", "default")
    b = dc._hand_coeffs("c1", "HashJoin", "default")
    assert a is b  # cached
    assert dc._hand_coeffs("c2", "HashJoin", "default") != a


def test_tuned_closer_to_truth_than_default():
    """Tuned constants are within ~e^1 of truth; default within ~e^4."""
    from repro.scope.simulator import OP_COEF

    ratios_d, ratios_t = [], []
    for op in OP_COEF:
        for cluster in ("cluster1", "cluster2", "cluster3", "cluster4"):
            a_d, _ = dc._hand_coeffs(cluster, op, "default")
            a_t, _ = dc._hand_coeffs(cluster, op, "tuned")
            ratios_d.append(abs(np.log(a_d / OP_COEF[op][0])))
            ratios_t.append(abs(np.log(a_t / OP_COEF[op][0])))
    assert np.mean(ratios_t) < np.mean(ratios_d)


def test_default_cost_orders_of_magnitude_off():
    """At production scale the default model shows the Figure 1 profile:
    large median error, huge tail error, near-zero correlation."""
    from repro.experiments.common import get_logs

    ops, _ = get_logs("cluster4")
    s = summarize(ops.cost_default.to_numpy(), ops.actual.to_numpy())
    assert s["median_error_pct"] > 60
    assert s["p95_error_pct"] > 400
    assert abs(s["correlation"]) < 0.6


def test_default_ratio_spread_both_directions():
    """Figure 1: both under- and over-estimation tails."""
    from repro.experiments.common import get_logs

    ops, _ = get_logs("cluster4")
    r = (ops.cost_default / ops.actual.clip(lower=1e-9)).to_numpy()
    assert np.quantile(r, 0.02) < 0.3
    assert np.quantile(r, 0.98) > 8


def test_truecard_variant_still_inaccurate(tiny):
    """§6.4: perfect cardinalities do not fix the cost model."""
    _, ops, _ = tiny
    s = summarize(ops.cost_default_truecard.to_numpy(), ops.actual.to_numpy())
    assert s["median_error_pct"] > 40


def test_costs_positive(tiny):
    _, ops, _ = tiny
    assert (ops.cost_default > 0).all()
    assert (ops.cost_tuned > 0).all()

"""Tests for resource-context and partition exploration (§5.2-§5.3)."""
import numpy as np
import pytest

from repro.core.models import LinearModel, ModelBank
from repro.core.features import FEATURE_NAMES, P_FEATURE_INDEX
from repro.optimizer import resource as res


def test_geometric_samples_sequence():
    # x_{i+1} = ceil(x_i + x_i/s) with s=1: 1, 2, 4, 8, ...
    assert res.geometric_samples(1.0, p_max=100) == [1, 2, 4, 8, 16, 32, 64]


def test_geometric_samples_s_controls_density():
    dense = res.geometric_samples(10.0, p_max=1000)
    sparse = res.geometric_samples(1.0, p_max=1000)
    assert len(dense) > len(sparse)


def test_geometric_samples_n_hits_target():
    for n in (5, 10, 20):
        s = res.geometric_samples_n(n)
        assert len(s) <= n
        assert len(s) >= n - 2
        assert s[0] == 1 and s[-1] <= res.MAX_P


def test_uniform_samples_span():
    s = res.uniform_samples(10)
    assert s[0] == 1 and s[-1] == res.MAX_P


def test_random_samples_deterministic():
    assert res.random_samples(8, seed=1) == res.random_samples(8, seed=1)
    assert res.random_samples(8, seed=1) != res.random_samples(8, seed=2)


def _bank_with_operator_model(coef_overrides: dict, intercept=0.0) -> ModelBank:
    bank = ModelBank()
    # Operator family uses context features (+2 cols).
    coef = np.zeros(len(FEATURE_NAMES) + 2)
    for name, v in coef_overrides.items():
        coef[FEATURE_NAMES.index(name)] = v
    bank.models["Operator"]["Extract"] = LinearModel(coef, intercept, 10, -30, 30)
    return bank


def _row(p=10):
    return {
        "I": 1e6, "B": 1e6, "C": 1e5, "L": 100.0, "P": p, "in_hash": 0.5,
        "pm": 0.5, "cl": 3, "depth": 2, "sig_sub": 1, "sig_approx": 2,
        "sig_opinput": 3, "op": "Extract",
    }


def test_resolve_model_cascade_order():
    bank = _bank_with_operator_model({})
    row = _row()
    model, ctx = res.resolve_model(bank, row)
    assert ctx is True  # operator family uses context features
    # A subgraph model must win over the operator model.
    sub = LinearModel(np.zeros(len(FEATURE_NAMES)), 1.0, 5, -30, 30)
    bank.models["Op-Subgraph"][row["sig_sub"]] = sub
    model2, ctx2 = res.resolve_model(bank, row)
    assert model2 is sub and ctx2 is False


def test_resolve_model_none_when_empty():
    assert res.resolve_model(ModelBank(), _row()) is None


def test_predict_costs_counts_lookups():
    bank = _bank_with_operator_model({})
    counter = res.LookupCounter()
    res.predict_costs_at(bank, _row(), np.array([1.0, 2.0, 4.0]), counter)
    assert counter.lookups == 3


def test_analytical_case_interior_optimum():
    """theta_P > 0 and theta_C > 0 -> P* = sqrt(tP/tC) (§5.3 case iii)."""
    bank = _bank_with_operator_model({"f_IL_P": 1e-8, "f_P": 1e-3})
    ctx = res.ResourceContext()
    ctx.attach(_row())
    counter = res.LookupCounter()
    p = res.optimize_stage_analytical(bank, ctx, counter)
    tp = 1e-8 * 1e6 * 100
    expected = int(round(np.sqrt(tp / 1e-3)))
    assert p == pytest.approx(expected, abs=1)
    assert counter.lookups == 1


def test_analytical_case_max_partitions():
    bank = _bank_with_operator_model({"f_IL_P": 1e-8, "f_P": -1e-3})
    ctx = res.ResourceContext()
    ctx.attach(_row())
    assert res.optimize_stage_analytical(bank, ctx, res.LookupCounter()) == res.MAX_P


def test_analytical_case_min_partitions():
    bank = _bank_with_operator_model({"f_IL_P": -1e-8, "f_P": 1e-3})
    ctx = res.ResourceContext()
    ctx.attach(_row())
    assert res.optimize_stage_analytical(bank, ctx, res.LookupCounter()) == 1


def test_analytical_degenerate_returns_one():
    bank = _bank_with_operator_model({})
    ctx = res.ResourceContext()
    ctx.attach(_row())
    assert res.optimize_stage_analytical(bank, ctx, res.LookupCounter()) == 1


def test_sampling_finds_model_minimum():
    """With a true U-shaped predicted cost, dense sampling must find a
    near-optimal count."""
    bank = _bank_with_operator_model({"f_IL_P": 1e-8, "f_P": 1e-3})
    ctx = res.ResourceContext()
    ctx.attach(_row())
    counter = res.LookupCounter()
    p = res.optimize_stage_sampling(
        bank, ctx, list(range(1, res.MAX_P, 10)), counter
    )
    analytical = res.optimize_stage_analytical(bank, ctx, res.LookupCounter())
    assert abs(p - analytical) <= 15


def test_stage_costs_sum_over_operators():
    bank = _bank_with_operator_model({}, intercept=1.0)
    ctx = res.ResourceContext()
    ctx.attach(_row())
    ctx.attach(_row())
    counter = res.LookupCounter()
    costs = res.stage_costs_at(bank, ctx, np.array([10.0]), counter)
    single = res.predict_costs_at(bank, _row(), np.array([10.0]), res.LookupCounter())
    assert costs[0] == pytest.approx(2 * single[0])


def test_node_feature_row_from_plan(tiny):
    cl, _, _ = tiny
    tpl = cl.templates[0]
    from repro.scope import simulator as sim

    pm, bc, bl = cl.instance_inputs(tpl, 1, 0)
    sim.instantiate(tpl.root, cl.world, bc, bl, pm, ("t", 1))
    node = next(n for n in tpl.root.walk() if n.op == "Extract")
    row = res.node_feature_row(node, pm)
    assert row["I"] == node.est_in and row["P"] == node.partitions
    assert row["op"] == "Extract"

"""Resource-aware partition exploration (§5.2-§5.3).

The paper extends Cascades with three abstractions:

- a **resource-context** per stage, to which each operator attaches its
  learned partition-cost information during *partition exploration*;
- **partition exploration**: candidate partition counts are scored with
  the learned models — either by *sampling* (random / uniform /
  geometric candidate sets) or *analytically*;
- **partition optimization**: at the stage boundary, the partitioning
  operator picks the count minimizing the stage's total predicted cost.

The analytical model reuses the individual learned models: fixing all
non-partition features, the learned (log-)cost of an operator reduces to
``θ_P / P + θ_C · P + const``; summing θs across the stage's operators
and differentiating gives ``P* = sqrt(Σθ_P / Σθ_C)`` when both sums are
positive, the maximum when increasing P is free, and the minimum when it
only hurts (the three cases of §5.3). Model look-ups are counted so the
Fig 8c / Fig 17 efficiency comparison can be reproduced.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.features import feature_matrix, partition_thetas
from repro.core.models import FAMILIES, LinearModel, ModelBank
from repro.scope.plan import PlanNode, hash64

MAX_P = 3000  # maximum machines on a virtual cluster (§6.5)


def node_feature_row(node: PlanNode, pm: float) -> dict:
    """The optimizer-visible statistics of one plan operator, in the
    layout the feature builder expects (estimated stats only)."""
    return {
        "I": node.est_in,
        "B": node.est_base,
        "C": node.est_out,
        "L": node.row_len,
        "P": node.partitions,
        "in_hash": hash64(tuple(sorted(set(node.input_templates)))) / float(2**63),
        "pm": pm,
        "cl": node.logical_count(),
        "depth": node.depth(),
        "sig_sub": node.sig_subgraph(),
        "sig_approx": node.sig_approx(),
        "sig_opinput": node.sig_opinput(),
        "op": node.op,
    }


@dataclass
class LookupCounter:
    """Counts learned-model invocations during planning (Fig 8c)."""

    lookups: int = 0


def resolve_model(bank: ModelBank, row: dict) -> tuple[LinearModel, bool] | None:
    """Most-specialized covering model for an operator instance (§5.1
    look-up order: subgraph → subgraphApprox → input → operator).
    Returns (model, uses_context_features) or None."""
    for spec in FAMILIES:
        m = bank.models[spec.name].get(row[spec.key_col])
        if m is not None:
            return m, spec.context
    return None


def predict_costs_at(
    bank: ModelBank, row: dict, partitions: np.ndarray, counter: LookupCounter,
    clipped: bool = True,
) -> np.ndarray:
    """Predicted cost of one operator at each candidate partition count.

    With ``clipped=False`` the training-envelope guard is lifted and the
    model's analytical form is evaluated — appropriate for partition
    exploration, where far-out-of-envelope counts must price as
    expensive rather than saturate (§5.3)."""
    resolved = resolve_model(bank, row)
    if resolved is None:
        return np.zeros(len(partitions))
    model, context = resolved
    pdf = pd.DataFrame([row] * len(partitions))
    pdf["P"] = partitions
    X = feature_matrix(pdf, context=context)
    counter.lookups += len(partitions)
    return model.predict(X) if clipped else model.predict_unclipped(X)


# ---------------------------------------------------------------------------
# Candidate generators (§5.3 sampling-based approach)
# ---------------------------------------------------------------------------

def geometric_samples(s: float, p_max: int = MAX_P, limit: int | None = None) -> list[int]:
    """x_{i+1} = ceil(x_i + x_i / s), x_0 = 1, x_1 = 2 (§5.3)."""
    out = [1, 2]
    while out[-1] < p_max:
        nxt = math.ceil(out[-1] + out[-1] / s)
        if nxt > p_max:
            break
        out.append(nxt)
        if limit is not None and len(out) >= limit:
            break
    return out


def geometric_samples_n(n: int, p_max: int = MAX_P) -> list[int]:
    """A geometric ladder with ~n samples: binary-search the skipping
    coefficient so the ladder reaches p_max in n steps."""
    n = max(2, n)
    lo, hi = 0.3, 200.0
    for _ in range(40):
        s = (lo + hi) / 2
        k = len(geometric_samples(s, p_max))
        if k < n:
            lo = s
        else:
            hi = s
    return geometric_samples(hi, p_max)[:n]


def uniform_samples(n: int, p_max: int = MAX_P) -> list[int]:
    return sorted({int(round(x)) for x in np.linspace(1, p_max, max(2, n))})


def random_samples(n: int, p_max: int = MAX_P, seed: int = 0) -> list[int]:
    g = np.random.default_rng(seed)
    return sorted({1, *map(int, g.integers(1, p_max + 1, max(1, n - 1)))})


# ---------------------------------------------------------------------------
# Stage-level exploration + optimization
# ---------------------------------------------------------------------------

@dataclass
class ResourceContext:
    """Per-stage resource context (§5.2): the operators of the stage and
    the partition-cost information they attached."""

    rows: list[dict] = field(default_factory=list)  # one per operator

    def attach(self, row: dict) -> None:
        self.rows.append(row)


def stage_costs_at(
    bank: ModelBank, ctx: ResourceContext, partitions: np.ndarray,
    counter: LookupCounter, clipped: bool = True,
) -> np.ndarray:
    """Total predicted stage cost at each candidate partition count."""
    total = np.zeros(len(partitions))
    for row in ctx.rows:
        total += predict_costs_at(bank, row, partitions, counter, clipped=clipped)
    return total


def optimize_stage_sampling(
    bank: ModelBank, ctx: ResourceContext, candidates: list[int],
    counter: LookupCounter, clipped: bool = True,
) -> int:
    """Partition optimization over an explicit candidate set."""
    cand = np.array(sorted(set(candidates)), dtype=float)
    costs = stage_costs_at(bank, ctx, cand, counter, clipped=clipped)
    return int(cand[int(np.argmin(costs))])


def optimize_stage_analytical(
    bank: ModelBank, ctx: ResourceContext, counter: LookupCounter,
    p_max: int = MAX_P,
) -> int:
    """The closed-form optimum of §5.3 from summed elastic-net weights."""
    sum_tp = 0.0
    sum_tc = 0.0
    for row in ctx.rows:
        resolved = resolve_model(bank, row)
        if resolved is None:
            continue
        model, _ = resolved
        tp, tc = partition_thetas(model.raw_coef, row["I"], row["C"], row["L"])
        counter.lookups += 1
        sum_tp += tp
        sum_tc += tc
    if sum_tp > 0 and sum_tc <= 0:
        return p_max  # more partitions never hurt
    if sum_tp <= 0 and sum_tc > 0:
        return 1  # more partitions only hurt
    if sum_tp > 0 and sum_tc > 0:
        return int(np.clip(round(math.sqrt(sum_tp / sum_tc)), 1, p_max))
    return 1  # degenerate: no partition signal in the learned weights

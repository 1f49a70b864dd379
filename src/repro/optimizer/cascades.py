"""Cascades-style physical planning with pluggable cost models (§5).

``CleoPlanner`` mirrors the paper's modified *Optimize Inputs* task
(Fig 8a): it enumerates physical alternatives for the logical choice
points (join implementation, aggregation strategy, optional local
pre-aggregation — the §6.6.2 plan-change classes), derives statistics,
and costs each candidate with the learned model hierarchy instead of
the default cost model. During costing each operator attaches its
partition-cost information to the stage's resource-context (partition
exploration); at the stage boundary the partitioning operator picks the
count minimizing total predicted stage cost (partition optimization).
A required co-partitioning property from a join fixes the other side's
exchange without exploration (Fig 8a step 2).

``DefaultPlanner`` is the baseline: the default cost model at a fixed
assumed degree of parallelism, partition counts from the local
heuristic — i.e., SCOPE's stock behaviour.

Planning returns the chosen *executed* plan: the substrate simulator
fills actual latencies for whatever plan is chosen, using common random
numbers so two planners' choices for the same job instance are
comparable (§6.6.1).
"""
from __future__ import annotations

import itertools
import time
from dataclasses import dataclass

import numpy as np

from repro.core.models import ModelBank
from repro.optimizer import resource as res
from repro.scope import default_cost as dc
from repro.scope import simulator as sim
from repro.scope.plan import (
    PlanNode,
    assign_input_templates,
    choice_points,
    expand_physical,
    plan_stages,
)
from repro.scope.workload import JobTemplate

MAX_CANDIDATES = 64  # exhaustive enumeration cap (<= 2 joins x 1 agg here)


@dataclass
class PlanResult:
    root: PlanNode  # chosen physical plan, fully instantiated
    choices: dict  # physical choices made
    predicted_cost: float
    lookups: int  # learned-model invocations
    planning_seconds: float
    actual_latency: float  # simulated end-to-end latency of the choice
    cpu_seconds: float


def _candidates(tpl: JobTemplate) -> list[dict]:
    points = choice_points(tpl.logical_root)
    if not points:
        return [dict(tpl.choices)]
    ids = [cid for cid, _ in points]
    alt_lists = [alts for _, alts in points]
    combos = itertools.islice(itertools.product(*alt_lists), MAX_CANDIDATES)
    return [dict(zip(ids, combo)) for combo in combos]


def _instantiated(tpl: JobTemplate, choices: dict, world: sim.World, base_cards,
                  base_lens, pm: float, seed_parts: tuple,
                  preset: bool = False) -> PlanNode:
    root = expand_physical(tpl.logical_root, choices)
    assign_input_templates(root)
    sim.instantiate(root, world, base_cards, base_lens, pm, seed_parts,
                    preset_partitions=preset)
    return root


class DefaultPlanner:
    """Baseline: default cost model, heuristic partitioning."""

    def __init__(self, cluster: str):
        self.cluster = cluster

    def plan(self, tpl: JobTemplate, world: sim.World, base_cards, base_lens,
             pm: float, seed_parts: tuple) -> PlanResult:
        t0 = time.perf_counter()
        best = None
        for choices in _candidates(tpl):
            root = _instantiated(tpl, choices, world, base_cards, base_lens, pm,
                                 seed_parts)
            cost = sum(dc.default_cost(self.cluster, n) for n in root.walk())
            if best is None or cost < best[0]:
                best = (cost, root, choices)
        cost, root, choices = best
        return PlanResult(
            root=root, choices=choices, predicted_cost=cost, lookups=0,
            planning_seconds=time.perf_counter() - t0,
            actual_latency=sim.job_latency(root),
            cpu_seconds=sim.job_cpu_seconds(root),
        )


class CleoPlanner:
    """Learned cost models + resource-aware partition selection."""

    def __init__(
        self,
        bank: ModelBank,
        strategy: str = "analytical",  # or "geometric"/"uniform"/"random"
        sample_n: int = 20,
        explore_partitions: bool = True,
        accept_margin: float = 0.75,
    ):
        self.bank = bank
        self.strategy = strategy
        self.sample_n = sample_n
        self.explore_partitions = explore_partitions
        self.accept_margin = accept_margin

    # -- stage-level partition selection -------------------------------
    def _optimize_partitions(self, root: PlanNode, pm: float,
                             counter: res.LookupCounter) -> None:
        pinned: set[int] = set()  # exchanges fixed by a required property
        for stage in plan_stages(root):
            stage_root = stage[0]
            if stage_root.op != "Exchange":
                continue  # leaf Extract partitioning stays heuristic
            if id(stage_root) in pinned:
                continue  # co-partitioning requirement: no exploration
            parent_join = next(
                (n for n in stage if n.op in ("HashJoin", "MergeJoin")), None
            )
            ctx = res.ResourceContext()
            for node in stage:
                ctx.attach(res.node_feature_row(node, pm))
            # Exploration window around the heuristic count: the learned
            # models were trained near the logged partition counts, so
            # counts far outside that envelope are priced blindly (their
            # log-space predictions are clipped). Restricting the window
            # is the kind of regression guard §6.7 describes for
            # production; the full-range §5.3 cases live in resource.py
            # and are exercised by the Fig 17 experiment.
            p_def = stage_root.partitions
            p_lo, p_hi = max(1, p_def // 3), min(res.MAX_P, p_def * 3)
            if self.strategy == "analytical":
                p = res.optimize_stage_analytical(self.bank, ctx, counter)
            else:
                if self.strategy == "geometric":
                    cand = res.geometric_samples_n(self.sample_n)
                elif self.strategy == "uniform":
                    cand = res.uniform_samples(self.sample_n)
                else:
                    cand = res.random_samples(self.sample_n)
                cand = [c for c in cand if p_lo <= c <= p_hi] or [p_def]
                p = res.optimize_stage_sampling(self.bank, ctx, cand, counter)
            p = int(np.clip(p, p_lo, p_hi))
            # Partition optimization (Fig 8a step 9): keep the heuristic
            # count unless the models predict a material stage-cost win
            # (acceptance margin — churn guard in the §6.7 spirit).
            both = np.array(sorted({p, p_def}), dtype=float)
            costs = res.stage_costs_at(self.bank, ctx, both, counter)
            cost_at = dict(zip(both.astype(int), costs))
            if cost_at[p] < self.accept_margin * cost_at[p_def]:
                stage_root.partitions = p
            if parent_join is not None:
                # Required property: the other join input must
                # co-partition — set without exploration (Fig 8a step 2).
                for c in parent_join.children:
                    sp = c.stage_partition_root()
                    if sp.op == "Exchange":
                        sp.partitions = stage_root.partitions
                        pinned.add(id(sp))

    def plan(self, tpl: JobTemplate, world: sim.World, base_cards, base_lens,
             pm: float, seed_parts: tuple) -> PlanResult:
        t0 = time.perf_counter()
        counter = res.LookupCounter()
        best = None
        for choices in _candidates(tpl):
            root = _instantiated(tpl, choices, world, base_cards, base_lens, pm,
                                 seed_parts)
            if self.explore_partitions:
                self._optimize_partitions(root, pm, counter)
                # Re-derive non-partitioning ops & re-simulate latencies
                # for the chosen partition counts.
                sim.instantiate(root, world, base_cards, base_lens, pm,
                                seed_parts, preset_partitions=True)
            cost = 0.0
            for node in root.walk():
                row = res.node_feature_row(node, pm)
                cost += float(
                    res.predict_costs_at(
                        self.bank, row, np.asarray([node.partitions], dtype=float),
                        counter,
                    )[0]
                )
            if best is None or cost < best[0]:
                best = (cost, root, choices)
        cost, root, choices = best
        return PlanResult(
            root=root, choices=choices, predicted_cost=cost,
            lookups=counter.lookups,
            planning_seconds=time.perf_counter() - t0,
            actual_latency=sim.job_latency(root),
            cpu_seconds=sim.job_cpu_seconds(root),
        )

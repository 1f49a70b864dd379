"""CLEO's optimizer integration (§5): a Cascades-style planner over the
SCOPE-like plan IR with pluggable cost models, plus the three
resource-awareness extensions the paper adds to Cascades —
resource-context, partition-exploration and partition-optimization.

- :mod:`repro.optimizer.cascades` — logical plan extraction, physical
  alternative enumeration (join implementation, aggregation strategy,
  optional local pre-aggregation), costing with either the default cost
  model or the learned model hierarchy, and plan selection;
- :mod:`repro.optimizer.resource` — partition-count exploration:
  random/uniform/geometric sampling and the analytical closed form of
  §5.3 driven by the learned elastic-net weights.
"""

"""TPC-H-lite on real Spark (§6.6.2 / Figure 20).

The paper trains CLEO on 10 parameter-randomized runs of the 22 TPC-H
queries at SF1000 and feeds the learned models back, changing 6 query
plans (join implementation, partition counts, local aggregation). The
sandbox-scale analogue here:

- :mod:`repro.tpch.schema` registers the TPC-H-lite tables (lineitem,
  orders, customer, part, supplier, nation) as temp views at a chosen
  scale factor;
- :mod:`repro.tpch.queries` defines eleven TPC-H-style queries as SQL
  templates runnable verbatim on Spark *and* DuckDB (the oracle), with
  a join-hint injection point — Spark join hints live in ``/*+ ... */``
  comments, which DuckDB ignores;
- :mod:`repro.tpch.planner` runs each query under a few training
  configurations (join strategy × shuffle-partition count), fits an
  elastic-net cost model per query template, lets it pick the
  configuration, and reports latency vs Spark's default plan.
"""

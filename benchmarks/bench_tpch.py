"""Benchmark for Figure 20: TPC-H-lite on real Spark with learned
cost-model feedback choosing join implementation + partition count.

SF is configurable via REPRO_TPCH_SF (default 0.05 ~ 50 MB) to bound
wall-clock; the paper ran SF1000 on production clusters.
"""
import os

from benchmarks._helpers import bench_table
from repro.experiments import fig20


def test_bench_fig20_tpch(benchmark, spark):
    sf = float(os.environ.get("REPRO_TPCH_SF", "0.05"))
    df = bench_table(benchmark, "fig20", lambda: fig20.run(spark, sf=sf))
    assert len(df) == 11
    # Plans change (6 of 22 in the paper; here nearly all — local
    # Spark's fixed 64-partition shuffle default is uniformly
    # over-partitioned at sandbox scale, mirroring §6.7's finding that
    # production jobs over-partition).
    changed = df[df.plan_changed]
    assert len(changed) > 0
    # The learned choices must not lose badly in aggregate: cumulative
    # latency across changed queries within 25% of default or better.
    tot_default = changed.default_latency_s.sum()
    tot_learned = changed.learned_latency_s.sum()
    assert tot_learned < tot_default * 1.25

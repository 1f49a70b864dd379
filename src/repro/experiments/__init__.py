"""Experiment harnesses — one module per table/figure of the paper's
evaluation (§6). Each exposes a ``run(...)`` returning a pandas
DataFrame whose rows mirror the published table; ``jobs/`` wraps them
for spark-submit and ``benchmarks/`` regenerates them under
pytest-benchmark. Paper-vs-measured numbers are recorded in
EXPERIMENTS.md.
"""

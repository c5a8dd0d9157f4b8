"""Reproduction experiments — one module per table in EXPERIMENTS.md.

T1: APT attack step detection (streaming, all 8 demo queries).
T2: the four published query archetypes (batch latency + correctness).
T3: concurrent query scheduling (master-dependent vs independent).
T4: engine throughput/latency vs stream rate.

Each module exposes ``run(spark, ...) -> pd.DataFrame`` returning the
table rows, plus a ``format_table`` helper. ``jobs/*.py`` wrap them for
spark-submit; ``benchmarks/bench_table*.py`` time them.
"""

"""Experiment drivers — one module per evaluation table (paper Sec. 9).

Each module exposes ``run(spark, ...) -> list[dict]`` returning the
table's rows and ``format_table(rows) -> str`` rendering them like the
paper reports. ``jobs/table_*.py`` are thin spark-submit wrappers;
``benchmarks/test_b_*.py`` time the same code paths under
pytest-benchmark. Paper-vs-measured numbers are recorded in
EXPERIMENTS.md.
"""

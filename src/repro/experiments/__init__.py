"""Experiment harnesses reproducing the paper's evaluation tables.

Each module exposes ``run(spark, ...) -> pandas.DataFrame`` returning the
table's rows (paper numbers alongside measured ones where applicable);
``jobs/`` wraps them for spark-submit and ``benchmarks/`` wraps them for
pytest-benchmark. EXPERIMENTS.md records a captured copy of each.
"""

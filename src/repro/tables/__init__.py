"""One module per reproduced evaluation table.

Each module exposes ``compute(...) -> pandas.DataFrame`` producing the
same rows the paper reports, plus a ``PAPER`` constant with the published
numbers so EXPERIMENTS.md (and the jobs' stdout) can print them side by
side. ``jobs/`` are thin spark-submit wrappers; ``benchmarks/`` wrap the
same functions in pytest-benchmark.
"""

"""Per-table experiment harnesses (Section VI).

Each module reproduces one evaluation table at laptop scale and returns
rows ready for printing/markdown. ``jobs/*.py`` are thin spark-submit
wrappers; ``benchmarks/bench_*.py`` time representative cells with
pytest-benchmark and regenerate the full tables.
"""

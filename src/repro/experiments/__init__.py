"""Experiment drivers: one module per reproduced table (II–V).

Each module exposes ``run(...) -> rows`` plus a formatter; ``jobs/*.py`` are
thin spark-submit wrappers and ``benchmarks/*.py`` time the same entry
points. Paper-side numbers are embedded so every report prints
paper-vs-measured side by side (EXPERIMENTS.md is generated from these).
"""

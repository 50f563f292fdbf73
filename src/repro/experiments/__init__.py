"""Experiment harnesses, one per reproduced table (see DESIGN.md §3).

Each harness is a plain function taking a SparkSession plus scale
parameters and returning pandas DataFrames with the same rows the paper
reports; ``jobs/`` wraps them for spark-submit and ``benchmarks/`` times
them at reduced scale."""

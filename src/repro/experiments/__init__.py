"""Experiment harnesses, one per evaluation table/figure (DESIGN.md §6).

Each ``run*`` function takes the shared SparkSession, executes one
experiment on the Table-2-lite dataset registry, and returns a list of
row dicts — the same rows ``jobs/run_*.py`` print and EXPERIMENTS.md
records next to the paper's numbers.
"""

"""Experiment harnesses reproducing the paper's evaluation (Section 7).

One module per table family; see DESIGN.md §6 for the table → module →
job mapping. All harness functions return pandas DataFrames so jobs can
print them and EXPERIMENTS.md can record them verbatim.
"""

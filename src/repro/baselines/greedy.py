"""Greedy-Sort-GED baseline (Riesen, Ferrer & Bunke 2015).

Shares the Riesen–Bunke cost matrix with the LSAP baseline; only the
assignment solver differs (greedy sorted rows instead of Hungarian).
Re-exported here so jobs/tests address each paper baseline by module.
"""
from repro.baselines.lsap import greedy_sort_ged  # noqa: F401

"""Indexes and synopses (paper Section 5.1-5.2).

aR-trees are realized as two-level bucketed structures (DESIGN.md §2.3):
root = buckets/cells carrying the paper's aggregates, leaves = members.
Probing is a Spark join on bucket keys plus aggregate-bound filters.
"""

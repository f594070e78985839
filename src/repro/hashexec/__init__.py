"""Hash-based query execution baselines (paper Figures 2 and 3).

External (memory-limited) hash aggregation and Grace hash join with
partitioned spill files and explicit spilled-row accounting — the
comparator for the sort-based plans of Section 6.
"""

"""Dataset and query-workload generators for the evaluation (Section 6.1)."""

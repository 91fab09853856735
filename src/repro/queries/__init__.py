"""Evaluation workload (Table 1) and the Table 2 harness."""

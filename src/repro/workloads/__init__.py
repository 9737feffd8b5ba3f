"""Workload substrate: the paper's five pattern categories (§7.2)."""

"""Spark-submit entrypoints, one per dataset/table (DESIGN.md §6)."""

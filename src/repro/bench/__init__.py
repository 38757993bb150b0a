"""Evaluation roster, Spark grid harness, table builders, paper numbers."""

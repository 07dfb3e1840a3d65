"""Evaluation layer: metrics, the paper's worked example, table harness."""

"""Evaluation: metrics, paper-reported numbers, table harnesses."""

"""Evaluation: precision-recall metrics and the benchmark harness."""

"""Hybrid Metric Joiner — the paper's metric-space join baseline (Fig 7)."""

"""Weighted set-based fuzzy similarity measures [67] and ROC tooling (Fig 6)."""

"""Tokenized-String Joiner (TSJ): generate-filter-verify NSLD self-join."""

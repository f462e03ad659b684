"""The paper's tokenizer (§V): split names on whitespace and
punctuation, lowercase, and keep the token *multiset* (order never
matters for SLD/NSLD; we store a sorted list as the canonical form).
"""
from __future__ import annotations

import re

_SPLIT = re.compile(r"[^0-9a-zA-Z]+")


def tokenize(name: str) -> list[str]:
    """Tokenize ``name`` into a canonical (sorted) token multiset.

    Whitespace and punctuation are separators; empty tokens are dropped
    (a tokenized string never stores explicit ε tokens — padding happens
    inside the SLD bigraph).
    """
    return sorted(t for t in _SPLIT.split(name.lower()) if t)

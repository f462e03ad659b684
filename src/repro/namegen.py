"""Synthetic tokenized-name corpus with injected fraud rings.

Substitute for the paper's evaluation data (44.4 M names on Google
accounts from one region — not publicly available). The generator
reproduces the three properties the TSJ experiments depend on
(DESIGN.md §3):

1. a Zipf-skewed token vocabulary, so popular tokens exist and the
   max-frequency knob M has bite (paper §III-G.2, Figs 3/5);
2. fraud rings whose member names are small adversarial edits of a ring
   seed — character edits, abbreviations, initial drops — so similar
   pairs exist at a range of NSLD values and the T sweep (Figs 2/4) has
   structure;
3. some ring members whose *every* token is edited, so the
   exact-token-matching approximation loses recall at larger T exactly
   as in the paper (§V-B.2).

Everything is deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.tokenize import tokenize

_CONSONANTS = list("bcdfghjklmnprstvwyz")
_VOWELS = list("aeiou")


def _make_token(rng: np.random.Generator, n_syllables: int) -> str:
    """A pronounceable CV(C) token, e.g. 'maron', 'kelit'."""
    parts = []
    for _ in range(n_syllables):
        parts.append(rng.choice(_CONSONANTS) + rng.choice(_VOWELS))
    if rng.random() < 0.6:
        parts.append(rng.choice(_CONSONANTS))
    return "".join(parts)


def token_vocabulary(
    seed: int = 13, n_first: int = 400, n_last: int = 1200
) -> tuple[list[str], list[str]]:
    """Distinct first-name-like and surname-like token vocabularies."""
    rng = np.random.default_rng(seed)
    seen: set[str] = set()

    def draw(n: int, syllables: tuple[int, int]) -> list[str]:
        out: list[str] = []
        while len(out) < n:
            t = _make_token(rng, int(rng.integers(*syllables)))
            if t not in seen:
                seen.add(t)
                out.append(t)
        return out

    # Syllable counts give first tokens of ~4-8 chars and surnames of
    # ~4-12 chars. Long tokens matter: at T=0.1 two distinct tokens can
    # satisfy NLD <= T only when they are ~10+ chars (Lemma 8), and the
    # paper's exact-token-matching recall dip at small T (Fig 5) exists
    # only if such token pairs occur.
    return draw(n_first, (2, 4)), draw(n_last, (2, 6))


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1) ** alpha
    return w / w.sum()


def _base_name(rng: np.random.Generator, firsts, lasts, wf, wl) -> list[str]:
    """A 2-4 token name: first [middle-initial|middle] last [suffix]."""
    toks = [str(rng.choice(firsts, p=wf)), str(rng.choice(lasts, p=wl))]
    r = rng.random()
    if r < 0.25:
        toks.insert(1, rng.choice(list("abcdefghijklmnoprst")))  # initial
    elif r < 0.40:
        toks.insert(1, str(rng.choice(firsts, p=wf)))  # middle name
    if rng.random() < 0.08:
        toks.append(str(rng.choice(["jr", "ii", "iii"])))
    return toks


def _edit_token(rng: np.random.Generator, tok: str) -> str:
    """One character-level edit (insert/delete/substitute) on ``tok``."""
    op = rng.integers(0, 3)
    i = int(rng.integers(0, max(1, len(tok))))
    c = str(rng.choice(_CONSONANTS + _VOWELS))
    if op == 0:  # insert
        return tok[:i] + c + tok[i:]
    if op == 1 and len(tok) > 1:  # delete
        return tok[:i] + tok[i + 1 :]
    if i < len(tok) and c == tok[i]:  # substitution must actually change
        c = "x" if c != "x" else "q"
    return tok[:i] + c + tok[i + 1 :]  # substitute


def perturb_name(
    rng: np.random.Generator, tokens: list[str], *, aggressive: bool = False
) -> list[str]:
    """An adversarial clone of ``tokens`` (paper §I-A: slight well-crafted
    edits that keep a bank officer unalarmed).

    Default profile: 1-3 character edits spread over the tokens, with a
    small chance of dropping or abbreviating a token. ``aggressive``
    edits *every* token at least once — these clones can never share a
    token with the seed, which is what degrades exact-token-matching.
    """
    toks = list(tokens)
    if aggressive:
        toks = [_edit_token(rng, t) for t in toks]
        if rng.random() < 0.3 and len(toks) > 2:
            toks.pop(int(rng.integers(0, len(toks))))
        return toks
    n_edits = 1 + int(rng.geometric(0.6))  # 1-3 typical
    for _ in range(n_edits):
        r = rng.random()
        if r < 0.70:  # char edit on a random token
            i = int(rng.integers(0, len(toks)))
            toks[i] = _edit_token(rng, toks[i])
        elif r < 0.80 and len(toks) > 2:  # drop a short token
            short = min(range(len(toks)), key=lambda j: len(toks[j]))
            toks.pop(short)
        elif r < 0.90:  # abbreviate a token to an initial-ish prefix
            i = int(rng.integers(0, len(toks)))
            toks[i] = toks[i][: max(1, int(rng.integers(1, 3)))]
        else:  # add an initial
            toks.append(str(rng.choice(list("abcdefghijklmnoprst"))))
    return [t for t in toks if t]


def names_corpus_pdf(
    n: int = 2000,
    seed: int = 7,
    *,
    ring_fraction: float = 0.35,
    mean_ring_size: int = 6,
    aggressive_fraction: float = 0.25,
    alpha: float = 1.0,
) -> pd.DataFrame:
    """The corpus as pandas: columns ``sid`` (int64), ``name`` (str),
    ``ring`` (int64; -1 for background names).

    ``ring_fraction`` of the rows belong to fraud rings; each ring is a
    seed name plus clones from :func:`perturb_name`, with
    ``aggressive_fraction`` of the clones using the every-token-edited
    profile.
    """
    rng = np.random.default_rng(seed)
    firsts, lasts = token_vocabulary(seed=13)
    wf = _zipf_weights(len(firsts), alpha)
    wl = _zipf_weights(len(lasts), alpha)

    rows: list[tuple[str, int]] = []
    n_ring_rows = int(n * ring_fraction)
    ring_id = 0
    while len(rows) < n_ring_rows:
        seed_toks = _base_name(rng, firsts, lasts, wf, wl)
        size = max(2, int(rng.poisson(mean_ring_size)))
        rows.append((" ".join(seed_toks), ring_id))
        for _ in range(size - 1):
            if len(rows) >= n_ring_rows:
                break
            clone = perturb_name(
                rng, seed_toks, aggressive=rng.random() < aggressive_fraction
            )
            rows.append((" ".join(clone), ring_id))
        ring_id += 1
    while len(rows) < n:
        rows.append((" ".join(_base_name(rng, firsts, lasts, wf, wl)), -1))
    pdf = pd.DataFrame(rows, columns=["name", "ring"])
    pdf.insert(0, "sid", np.arange(len(pdf), dtype=np.int64))
    pdf["ring"] = pdf["ring"].astype(np.int64)
    return pdf


def names_corpus(spark: SparkSession, n: int = 2000, seed: int = 7, **kw) -> DataFrame:
    """Spark view of :func:`names_corpus_pdf`."""
    return spark.createDataFrame(names_corpus_pdf(n, seed, **kw))


def tokenized_strings_pdf(names: pd.DataFrame) -> pd.DataFrame:
    """Attach the canonical token multiset and its metadata to a corpus:
    ``tokens`` (sorted list), ``l`` = L(x^t), ``nt`` = T(x^t),
    ``tok_lens`` (sorted token-length histogram). Rows that tokenize to
    nothing are dropped (an empty tokenized string joins with nothing
    below T < 1)."""
    out = names.copy()
    out["tokens"] = out["name"].map(tokenize)
    out = out[out["tokens"].map(len) > 0].reset_index(drop=True)
    out["l"] = out["tokens"].map(lambda ts: sum(len(t) for t in ts)).astype("int32")
    out["nt"] = out["tokens"].map(len).astype("int32")
    out["tok_lens"] = out["tokens"].map(lambda ts: sorted(len(t) for t in ts))
    return out


def name_changes_pdf(n: int = 10_000, seed: int = 11) -> pd.DataFrame:
    """The Fig-6 study data: ``old_name``, ``new_name``, ``is_fraud``.

    Half the rows are legitimate changes (abbreviation "william"->"bill"
    style truncation, typo-scale edits, marriage-style surname swap that
    keeps the rest); half are fraudulent drastic renames (the account was
    resold — the name is replaced wholesale, occasionally keeping one
    token as camouflage).
    """
    rng = np.random.default_rng(seed)
    firsts, lasts = token_vocabulary(seed=13)
    wf = _zipf_weights(len(firsts), 1.0)
    wl = _zipf_weights(len(lasts), 1.0)
    rows = []
    for i in range(n):
        old = _base_name(rng, firsts, lasts, wf, wl)
        fraud = i % 2 == 1
        if not fraud:
            new = list(old)
            r = rng.random()
            if r < 0.4:  # abbreviation / nickname-style truncation
                j = int(rng.integers(0, len(new)))
                keep = max(2, len(new[j]) // 2)
                new[j] = new[j][:keep]
            elif r < 0.8:  # typo-scale edit
                j = int(rng.integers(0, len(new)))
                new[j] = _edit_token(rng, new[j])
            else:  # surname change, rest kept
                new[-1] = str(rng.choice(lasts, p=wl))
        else:
            new = _base_name(rng, firsts, lasts, wf, wl)
            if rng.random() < 0.15:  # keep one token as camouflage
                new[int(rng.integers(0, len(new)))] = old[
                    int(rng.integers(0, len(old)))
                ]
        rows.append((" ".join(old), " ".join(new), fraud))
    return pd.DataFrame(rows, columns=["old_name", "new_name", "is_fraud"])

"""Preprocessing options (the P axis of the join-function space).

The paper's P axis (Figure 2 / Table 1) combines Lowercase (L), Stemming
(S), and Remove-Punctuation (RP) into four variants used in experiments:
``L``, ``L+S``, ``L+RP``, ``L+S+RP``. Lowercasing is always on, matching
Table 1 where every variant includes ``L``.

Stemming here is a light suffix-stripper in the spirit of Porter step 1
(plural / "-ing" / "-ed" / "-al" suffixes), which is what matters for
join-function diversity: it merges inflectional variants ("Bulldogs" vs
"Bulldog", "baseball" stays put) without external NLP dependencies.
"""
from __future__ import annotations

import re
from functools import lru_cache

# Order matters: longest suffix first.
_SUFFIX_RULES: tuple[tuple[str, str], ...] = (
    ("sses", "ss"),
    ("ies", "i"),
    ("ing", ""),
    ("edly", ""),
    ("ed", ""),
    ("ss", "ss"),  # keep "-ss" (guard before the generic "-s" rule)
    ("s", ""),
)

_PUNCT_RE = re.compile(r"[^\w\s]")
_WS_RE = re.compile(r"\s+")

#: The four preprocessing variants used throughout the experiments.
VARIANTS: tuple[str, ...] = ("L", "L+S", "L+RP", "L+S+RP")


def stem_word(word: str) -> str:
    """Light suffix-stripping stem of a single word.

    Only strips when the remaining stem keeps length >= 3, so short words
    ("lsu", "is") and numbers are untouched.
    """
    for suffix, repl in _SUFFIX_RULES:
        if word.endswith(suffix):
            stem = word[: len(word) - len(suffix)] + repl
            if len(stem) >= 3:
                return stem
            return word
    return word


def stem_text(text: str) -> str:
    """Stem every whitespace-separated word of ``text``."""
    return " ".join(stem_word(w) for w in text.split())


def remove_punctuation(text: str) -> str:
    """Replace punctuation with nothing and collapse whitespace."""
    return _WS_RE.sub(" ", _PUNCT_RE.sub("", text)).strip()


@lru_cache(maxsize=200_000)
def preprocess(text: str, variant: str) -> str:
    """Apply preprocessing ``variant`` (one of :data:`VARIANTS`) to ``text``.

    Cached because the same record string is preprocessed once per variant
    but requested once per candidate pair.
    """
    if variant not in VARIANTS:
        raise ValueError(f"unknown preprocessing variant {variant!r}")
    out = text.lower().strip()
    if "RP" in variant:
        out = remove_punctuation(out)
    if "S" in variant.split("+"):
        out = stem_text(out)
    return _WS_RE.sub(" ", out).strip()

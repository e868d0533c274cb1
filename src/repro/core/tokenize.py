"""Tokenization options (the T axis): 3-gram and whitespace.

The paper's 3-gram tokenizer pads with ``$`` on both sides ("$$2", "$20",
..., "m$$" in Figure 2), i.e. q-1 pad characters per side. Tokens are
returned as **multisets** (lists); weighting code decides whether to
de-duplicate (the set-based distances in the paper operate on weighted
token sets, so we de-duplicate with summed weights there).
"""
from __future__ import annotations

from functools import lru_cache

PAD = "$"

#: Tokenization variants used in experiments.
VARIANTS: tuple[str, ...] = ("3G", "SP")


@lru_cache(maxsize=200_000)
def qgrams(text: str, q: int = 3) -> tuple[str, ...]:
    """Padded character q-grams of ``text`` (q-1 pads each side)."""
    if not text:
        return ()
    padded = PAD * (q - 1) + text + PAD * (q - 1)
    return tuple(padded[i : i + q] for i in range(len(padded) - q + 1))


@lru_cache(maxsize=200_000)
def space_tokens(text: str) -> tuple[str, ...]:
    """Whitespace tokens of ``text``."""
    return tuple(text.split())


def tokenize(text: str, variant: str) -> tuple[str, ...]:
    """Tokenize ``text`` with variant ``3G`` or ``SP``."""
    if variant == "3G":
        return qgrams(text, 3)
    if variant == "SP":
        return space_tokens(text)
    raise ValueError(f"unknown tokenization variant {variant!r}")

"""Identity-preserving string perturbations for benchmark generation.

These model the surface variation DBPedia entity-names show across
Wikipedia snapshots (paper §5.1.1): typos, dropped/added minor tokens,
suffix swaps ("team" ↔ "season"), punctuation/case drift, abbreviation.
A perturbation must NOT change which entity the string denotes — so
discriminative tokens (years, numerals, sports) are never edited by the
generic helpers; domains opt specific tokens in via ``protected``.
"""
from __future__ import annotations

import numpy as np

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def typo(s: str, rng: np.random.Generator, *, n_edits: int = 1, protected: set[str] | None = None) -> str:
    """Apply ``n_edits`` random character edits to unprotected word(s)."""
    words = s.split()
    editable = [
        i
        for i, w in enumerate(words)
        if len(w) >= 4 and not any(c.isdigit() for c in w) and w not in (protected or set())
    ]
    if not editable:
        return s
    for _ in range(n_edits):
        wi = int(rng.choice(editable))
        w = words[wi]
        pos = int(rng.integers(1, len(w)))
        op = rng.integers(0, 4)
        if op == 0 and len(w) > 4:  # delete
            w = w[:pos] + w[pos + 1 :]
        elif op == 1:  # insert
            w = w[:pos] + str(rng.choice(list(_ALPHABET))) + w[pos:]
        elif op == 2:  # substitute
            w = w[:pos] + str(rng.choice(list(_ALPHABET))) + w[pos + 1 :]
        else:  # transpose
            if pos < len(w) - 1:
                w = w[:pos] + w[pos + 1] + w[pos] + w[pos + 2 :]
        words[wi] = w
    return " ".join(words)


def drop_token(s: str, rng: np.random.Generator, *, droppable: set[str]) -> str:
    """Drop one token from the droppable (non-discriminative) set."""
    words = s.split()
    cand = [i for i, w in enumerate(words) if w in droppable]
    if not cand or len(words) <= 2:
        return s
    del words[int(rng.choice(cand))]
    return " ".join(words)


def add_token(s: str, rng: np.random.Generator, *, pool: list[str]) -> str:
    """Insert one extraneous token at a random position."""
    words = s.split()
    pos = int(rng.integers(0, len(words) + 1))
    words.insert(pos, str(rng.choice(pool)))
    return " ".join(words)


def swap_suffix(s: str, rng: np.random.Generator, *, pairs: list[tuple[str, str]]) -> str:
    """Replace a surface-synonym suffix token (e.g. team → season)."""
    words = s.split()
    for a, b in pairs:
        for i, w in enumerate(words):
            if w == a:
                words[i] = b
                return " ".join(words)
            if w == b:
                words[i] = a
                return " ".join(words)
    return s


def case_punct_drift(s: str, rng: np.random.Generator) -> str:
    """Case / punctuation drift: lowercase a word or strip punctuation."""
    if rng.random() < 0.5:
        return s.replace("'", "").replace(".", "").replace("–", "-")
    words = s.split()
    target = [i for i, w in enumerate(words) if w[:1].isupper() and not any(c.isdigit() for c in w)]
    if target:
        i = int(rng.choice(target))
        words[i] = words[i].lower()
    return " ".join(words)


def abbreviate(s: str, rng: np.random.Generator, *, phrases: dict[str, str]) -> str:
    """Replace a known multi-word phrase with its abbreviation."""
    for phrase, abbr in phrases.items():
        if phrase in s:
            return s.replace(phrase, abbr, 1)
    return s

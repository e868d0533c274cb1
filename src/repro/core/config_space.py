"""Enumeration of the join-function space (Table 1).

Full space: 4 preprocessing × 2 char-distances (8)
          + 4 preprocessing × 2 tokenizations × 2 weights × 8 set-distances (128)
          + 4 preprocessing × 1 embedding-distance (4)
          = 140 join functions, exactly the paper's count.

A *join function* ``f`` maps a string pair to a distance in [0, 1]. A
*configuration* ``C = ⟨f, θ⟩`` adds a threshold from a uniform grid of
``s`` steps (paper: s = 50). The reduced space (Table 6) stride-samples
24 functions so every parameter axis stays represented.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core import distance as D
from repro.core import preprocess as P
from repro.core import tokenize as T
from repro.core import weights as W


@dataclass(frozen=True)
class JoinFunction:
    """One point on the (P, T, W, D) grid.

    ``tokenization`` and ``weighting`` are ``None`` for character-based and
    embedding distances (those axes do not apply — Table 1 footnote).
    """

    preprocessing: str
    tokenization: str | None
    weighting: str | None
    dist: str

    @property
    def name(self) -> str:
        parts = [self.preprocessing, self.tokenization or "-", self.weighting or "-", self.dist]
        return "|".join(parts)

    @property
    def family(self) -> str:
        if self.dist in D.CHAR_DISTANCES:
            return "char"
        if self.dist in D.SET_DISTANCES:
            return "set"
        return "embedding"


def full_space() -> list[JoinFunction]:
    """All 140 join functions in canonical order."""
    fns: list[JoinFunction] = []
    for p in P.VARIANTS:
        for d in D.CHAR_DISTANCES:
            fns.append(JoinFunction(p, None, None, d))
        for t in T.VARIANTS:
            for w in W.VARIANTS:
                for d in D.SET_DISTANCES:
                    fns.append(JoinFunction(p, t, w, d))
        for d in D.EMBEDDING_DISTANCES:
            fns.append(JoinFunction(p, None, None, d))
    return fns


def reduced_space(k: int = 24) -> list[JoinFunction]:
    """Reduced subspace for Table 6: ``k`` functions stride-sampled so
    every parameter axis stays represented.

    The paper reduces the space by dropping parameter *options* (e.g.
    keeping 2 of 4 preprocessing variants), which preserves coverage of
    every axis. Stride-sampling each family achieves the same: the
    char/embedding families keep a spread of preprocessing variants, and
    the set family keeps both tokenizations, both weightings, and a
    spread of distance functions — less expressiveness, but no axis
    vanishes entirely.
    """
    fns = full_space()
    if k >= len(fns):
        return fns
    by_family: dict[str, list[JoinFunction]] = {"char": [], "set": [], "embedding": []}
    for f in fns:
        by_family[f.family].append(f)
    # Proportional quotas with floors so no family vanishes.
    quotas = {"char": max(2, round(k * 8 / 140)), "embedding": max(1, round(k * 4 / 140))}
    quotas["set"] = k - quotas["char"] - quotas["embedding"]

    def stride(pool: list[JoinFunction], q: int) -> list[JoinFunction]:
        if q >= len(pool):
            return list(pool)
        idx = sorted({round(i * (len(pool) - 1) / (q - 1)) for i in range(q)}) if q > 1 else [0]
        out = [pool[i] for i in idx]
        j = 0
        while len(out) < q:  # fill collisions from the front
            if pool[j] not in out:
                out.append(pool[j])
            j += 1
        return out

    out = stride(by_family["char"], quotas["char"])
    out += stride(by_family["set"], quotas["set"])
    out += stride(by_family["embedding"], quotas["embedding"])
    return out[:k]


def threshold_grid(s: int = 50) -> list[float]:
    """Uniform threshold grid over (0, 1]: ``i/s`` for i = 1..s."""
    return [i / s for i in range(1, s + 1)]

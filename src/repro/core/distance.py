"""Distance-function kernels (the D axis), all normalized to [0, 1].

Families (Figure 2 / Table 1):

- Character-based: normalized edit distance (``ED``), Jaro-Winkler
  distance (``JW``).
- Set-based over weighted token sets: Jaccard (``JD``), Cosine (``CD``),
  Max-include (``MD``), Dice (``DD``), Intersection (``ID``), and the
  paper's three hybrid containment variants ``CJD``/``CCD``/``CDD``
  (equal to the standard distance when the tokens of one record are a
  subset of the other's, else 1).
- Embedding: hashed character-trigram embedding cosine distance (``GED``
  substitute — see DESIGN.md §3).

The worked example in Figure 2 (l = {2012, tigers, lsu, baseball, team},
r = {2012, lsu, baseball, team}, equal weights) pins the definitions:
JD = 0.2, CD ≈ 0.106, MD = 0, DD ≈ 0.111, ID ≈ 0.556 — i.e.
``ID = 1 − w(∩)/(w(A)+w(B))``, ``MD = 1 − w(∩)/min(w(A), w(B))``.

`lev_batch` is a numpy DP vectorized **across the batch of pairs** (the
inner character loops are O(L1·L2) numpy ops on batch-sized vectors),
which is what makes computing 4 preprocessing variants × tens of
thousands of candidate pairs per dataset cheap inside `mapInPandas`.
"""
from __future__ import annotations

import math
from functools import lru_cache
from typing import Mapping, Sequence

import numpy as np

CHAR_DISTANCES: tuple[str, ...] = ("JW", "ED")
SET_DISTANCES: tuple[str, ...] = ("JD", "CD", "MD", "DD", "ID", "CJD", "CCD", "CDD")
EMBEDDING_DISTANCES: tuple[str, ...] = ("GED",)


# --------------------------------------------------------------------------
# Character-based
# --------------------------------------------------------------------------

def lev_batch(a: Sequence[str], b: Sequence[str], max_len: int = 64) -> np.ndarray:
    """Normalized Levenshtein distance for aligned string batches.

    Strings longer than ``max_len`` are truncated (join keys in this domain
    are short titles/names; truncation only affects pathological inputs).
    Returns ``lev(a_i, b_i) / max(len(a_i), len(b_i))`` in [0, 1]; two
    empty strings have distance 0.
    """
    n = len(a)
    if n != len(b):
        raise ValueError("batches must be aligned")
    if n == 0:
        return np.zeros(0)
    la = np.array([min(len(s), max_len) for s in a], dtype=np.int32)
    lb = np.array([min(len(s), max_len) for s in b], dtype=np.int32)
    L1, L2 = int(la.max(initial=0)), int(lb.max(initial=0))
    if L1 == 0 or L2 == 0:
        # One side entirely empty: distance is 1 unless both empty.
        denom = np.maximum(np.maximum(la, lb), 1)
        return np.where((la == 0) & (lb == 0), 0.0, np.minimum(np.maximum(la, lb) / denom, 1.0))
    # Distinct pad sentinels so pads never match real chars or each other.
    A = np.full((n, L1), -1, dtype=np.int32)
    B = np.full((n, L2), -2, dtype=np.int32)
    for i, s in enumerate(a):
        s = s[:max_len]
        if s:
            A[i, : len(s)] = np.frombuffer(s.encode("utf-32-le"), dtype=np.uint32).astype(np.int32)
    for i, s in enumerate(b):
        s = s[:max_len]
        if s:
            B[i, : len(s)] = np.frombuffer(s.encode("utf-32-le"), dtype=np.uint32).astype(np.int32)

    prev = np.tile(np.arange(L2 + 1, dtype=np.int32), (n, 1))
    out = np.empty(n, dtype=np.int32)
    done_at_zero = la == 0
    out[done_at_zero] = lb[done_at_zero]
    cur = np.empty_like(prev)
    for i in range(1, L1 + 1):
        cur[:, 0] = i
        sub = (A[:, i - 1 : i] != B).astype(np.int32)  # (n, L2)
        for j in range(1, L2 + 1):
            cur[:, j] = np.minimum(
                np.minimum(prev[:, j] + 1, cur[:, j - 1] + 1),
                prev[:, j - 1] + sub[:, j - 1],
            )
        hit = la == i
        if hit.any():
            out[hit] = cur[hit, lb[hit]]
        prev, cur = cur, prev
    denom = np.maximum(np.maximum(la, lb), 1)
    return np.minimum(out / denom, 1.0)


def jaro_similarity(a: str, b: str) -> float:
    """Classic Jaro similarity in [0, 1]."""
    if a == b:
        return 1.0
    la, lb = len(a), len(b)
    if la == 0 or lb == 0:
        return 0.0
    window = max(la, lb) // 2 - 1
    if window < 0:
        window = 0
    a_match = [False] * la
    b_match = [False] * lb
    matches = 0
    for i, ca in enumerate(a):
        lo, hi = max(0, i - window), min(lb, i + window + 1)
        for j in range(lo, hi):
            if not b_match[j] and b[j] == ca:
                a_match[i] = b_match[j] = True
                matches += 1
                break
    if matches == 0:
        return 0.0
    transpositions = 0
    j = 0
    for i in range(la):
        if a_match[i]:
            while not b_match[j]:
                j += 1
            if a[i] != b[j]:
                transpositions += 1
            j += 1
    t = transpositions / 2
    m = matches
    return (m / la + m / lb + (m - t) / m) / 3.0


def jaro_winkler_distance(a: str, b: str, p: float = 0.1, max_prefix: int = 4) -> float:
    """Jaro-Winkler distance ``1 − jw_sim`` with standard prefix boost."""
    sim = jaro_similarity(a, b)
    prefix = 0
    for ca, cb in zip(a[:max_prefix], b[:max_prefix]):
        if ca != cb:
            break
        prefix += 1
    return 1.0 - (sim + prefix * p * (1.0 - sim))


def jw_batch(a: Sequence[str], b: Sequence[str]) -> np.ndarray:
    """Jaro-Winkler distance for aligned string batches."""
    return np.array([jaro_winkler_distance(x, y) for x, y in zip(a, b)])


# --------------------------------------------------------------------------
# Set-based (weighted token sets)
# --------------------------------------------------------------------------

def set_distances(
    wa: Mapping[str, float], wb: Mapping[str, float]
) -> dict[str, float]:
    """All 8 set distances between weighted token maps ``wa`` and ``wb``.

    Keys of the maps are distinct tokens; values their weights. Returns a
    dict keyed by :data:`SET_DISTANCES`.
    """
    sum_a = sum(wa.values())
    sum_b = sum(wb.values())
    if sum_a == 0.0 and sum_b == 0.0:
        # Two empty records: identical, distance 0 across the board.
        return {d: 0.0 for d in SET_DISTANCES}
    if sum_a == 0.0 or sum_b == 0.0:
        return {d: 1.0 for d in SET_DISTANCES}
    small, big = (wa, wb) if len(wa) <= len(wb) else (wb, wa)
    inter = 0.0
    dot = 0.0
    n_common = 0
    for t, w in small.items():
        if t in big:
            inter += min(w, big[t])
            dot += w * big[t]
            n_common += 1
    union = sum_a + sum_b - inter
    norm_a = math.sqrt(sum(w * w for w in wa.values()))
    norm_b = math.sqrt(sum(w * w for w in wb.values()))
    jd = 1.0 - inter / union if union > 0 else 0.0
    cd = 1.0 - dot / (norm_a * norm_b) if norm_a > 0 and norm_b > 0 else 1.0
    md = 1.0 - inter / min(sum_a, sum_b)
    dd = 1.0 - 2.0 * inter / (sum_a + sum_b)
    idist = 1.0 - inter / (sum_a + sum_b)
    # Containment: token set of one record is a subset of the other's.
    contained = n_common == len(small)
    return {
        "JD": jd,
        "CD": min(max(cd, 0.0), 1.0),
        "MD": min(max(md, 0.0), 1.0),
        "DD": dd,
        "ID": idist,
        "CJD": jd if contained else 1.0,
        "CCD": min(max(cd, 0.0), 1.0) if contained else 1.0,
        "CDD": dd if contained else 1.0,
    }


# --------------------------------------------------------------------------
# Embedding (GED substitute): hashed character-trigram embedding
# --------------------------------------------------------------------------

_EMB_DIM = 64


@lru_cache(maxsize=200_000)
def embed(text: str) -> tuple[float, ...]:
    """Deterministic 64-d embedding: hashed char trigrams, mean over words.

    Stands in for GloVe/FastText (offline container); see DESIGN.md §3.
    """
    words = text.split()
    if not words:
        return (0.0,) * _EMB_DIM
    vec = np.zeros(_EMB_DIM)
    for w in words:
        padded = f"#{w}#"
        for i in range(max(1, len(padded) - 2)):
            tri = padded[i : i + 3]
            h = _stable_hash(tri)
            vec[h % _EMB_DIM] += 1.0 if (h >> 8) % 2 == 0 else -1.0
    n = np.linalg.norm(vec)
    if n > 0:
        vec /= n
    return tuple(vec.tolist())


def _stable_hash(s: str) -> int:
    """FNV-1a — stable across processes (``hash()`` is salted per run)."""
    h = 0x811C9DC5
    for ch in s.encode("utf-8"):
        h = ((h ^ ch) * 0x01000193) & 0xFFFFFFFF
    return h


def embedding_distance(a: str, b: str) -> float:
    """Cosine distance between hashed-trigram embeddings, in [0, 1]."""
    va = np.array(embed(a))
    vb = np.array(embed(b))
    na, nb = np.linalg.norm(va), np.linalg.norm(vb)
    if na == 0.0 and nb == 0.0:
        return 0.0
    if na == 0.0 or nb == 0.0:
        return 1.0
    cos = float(np.dot(va, vb) / (na * nb))
    # cos ∈ [−1, 1] → distance (1 − cos)/2 ∈ [0, 1].
    return min(max((1.0 - cos) / 2.0, 0.0), 1.0)

"""Synthetic multi-column ER benchmark (Magellan-benchmark substitute).

Eight datasets mirroring Table 3 — same domains, attribute counts, and
(scaled ~1/3) L–R sizes — generated with the structural properties
Algorithm 3 exploits: one or two *key* columns (title/name) that identify
the entity, *secondary* columns (director, year, phone, company) that
help disambiguate, and *noise* columns (descriptions) that carry no
match signal. R rows are reformatted/perturbed views of a subset of L's
entities plus R-only entities; columns have missing values.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.benchgen import perturb as P
from repro.benchgen import vocab as V
from repro.benchgen.single_column import FuzzyJoinDataset


@dataclass(frozen=True)
class ColumnSpec:
    """One attribute: its generator kind and its true informativeness."""

    name: str
    kind: str  # title | person | year | phone | category | number | noise
    role: str  # key | secondary | noise
    missing_rate: float = 0.0


@dataclass(frozen=True)
class MultiSpec:
    name: str
    domain: str
    columns: tuple[ColumnSpec, ...]
    n_l: int
    n_r: int
    n_matches: int


def _title(rng, words, n_words=(2, 4)):
    k = int(rng.integers(n_words[0], n_words[1] + 1))
    return " ".join(rng.choice(words, size=k, replace=False))


def _gen_base(kind: str, rng: np.random.Generator) -> str:
    if kind == "title":
        return _title(rng, V.MOVIE_WORDS + V.SONG_WORDS)
    if kind == "person":
        return f"{rng.choice(V.FIRST_NAMES)} {rng.choice(V.LAST_NAMES)}"
    if kind == "year":
        return str(rng.integers(1960, 2016))
    if kind == "phone":
        return f"{rng.integers(200, 999)}-{rng.integers(200, 999)}-{rng.integers(1000, 9999)}"
    if kind == "category":
        return str(rng.choice(["rock", "pop", "jazz", "folk", "electronic", "classical"]))
    if kind == "number":
        return str(rng.integers(40, 900))
    if kind == "noise":
        k = int(rng.integers(6, 14))
        return " ".join(rng.choice(V.NOISE_WORDS + V.MOVIE_WORDS + V.SONG_WORDS, size=k))
    raise ValueError(kind)


def _variant(kind: str, base: str, rng: np.random.Generator) -> str:
    """R-side reformatting of the same entity's attribute."""
    if kind == "title":
        r = rng.random()
        if r < 0.35:
            return P.typo(base, rng)
        if r < 0.6:
            return P.case_punct_drift(base, rng)
        if r < 0.8:
            return P.add_token(base, rng, pool=["The", "A"])
        return base
    if kind == "person":
        first, *rest = base.split()
        if rng.random() < 0.4 and rest:
            return f"{first[0]}. {' '.join(rest)}"
        if rng.random() < 0.3:
            return P.typo(base, rng)
        return base
    if kind == "phone":
        a, b, c = base.split("-")
        return f"({a}) {b}-{c}" if rng.random() < 0.5 else base
    if kind == "year":
        return base
    if kind == "category":
        return base.capitalize() if rng.random() < 0.5 else base
    if kind == "number":
        return str(int(base) + int(rng.integers(-2, 3))) if rng.random() < 0.3 else base
    if kind == "noise":
        return _gen_base("noise", rng)  # independent: no match signal
    raise ValueError(kind)


_SPECS: tuple[MultiSpec, ...] = (
    MultiSpec("FZ", "Restaurant", (
        ColumnSpec("name", "title", "key"),
        ColumnSpec("addr", "noise", "noise", 0.05),
        ColumnSpec("city", "category", "secondary"),
        ColumnSpec("phone", "phone", "secondary", 0.1),
        ColumnSpec("class", "category", "secondary"),
        ColumnSpec("notes", "noise", "noise", 0.2),
    ), 200, 130, 45),
    MultiSpec("DA", "Citation", (
        ColumnSpec("title", "title", "key"),
        ColumnSpec("authors", "person", "secondary", 0.05),
        ColumnSpec("venue", "category", "secondary", 0.1),
        ColumnSpec("year", "year", "secondary"),
    ), 450, 330, 240),
    MultiSpec("AB", "Product", (
        ColumnSpec("name", "title", "key"),
        ColumnSpec("description", "noise", "noise", 0.1),
        ColumnSpec("price", "number", "secondary", 0.2),
    ), 320, 320, 180),
    MultiSpec("RI", "Movie", (
        ColumnSpec("name", "title", "key"),
        ColumnSpec("director", "person", "secondary", 0.05),
        ColumnSpec("year", "year", "secondary"),
        ColumnSpec("rating", "number", "secondary", 0.15),
        ColumnSpec("genre", "category", "secondary"),
        ColumnSpec("duration", "number", "secondary", 0.1),
        ColumnSpec("synopsis", "noise", "noise", 0.1),
        ColumnSpec("cast", "person", "secondary", 0.2),
        ColumnSpec("studio", "category", "secondary", 0.2),
        ColumnSpec("review", "noise", "noise", 0.25),
    ), 550, 140, 60),
    MultiSpec("BR", "Beer", (
        ColumnSpec("beer_name", "title", "key"),
        ColumnSpec("factory_name", "title", "secondary", 0.05),
        ColumnSpec("style", "category", "secondary", 0.1),
        ColumnSpec("abv", "number", "secondary", 0.15),
    ), 450, 110, 35),
    MultiSpec("ABN", "Book", (
        ColumnSpec("title", "title", "key"),
        ColumnSpec("author", "person", "secondary", 0.05),
        ColumnSpec("pages", "number", "secondary", 0.1),
        ColumnSpec("publisher", "category", "secondary", 0.15),
        ColumnSpec("year", "year", "secondary", 0.1),
        ColumnSpec("isbn", "phone", "secondary", 0.3),
        ColumnSpec("language", "category", "secondary"),
        ColumnSpec("format", "category", "secondary", 0.2),
        ColumnSpec("blurb", "noise", "noise", 0.2),
        ColumnSpec("edition", "number", "secondary", 0.4),
        ColumnSpec("series", "noise", "noise", 0.5),
    ), 450, 120, 70),
    MultiSpec("IA", "Music", (
        ColumnSpec("song_name", "title", "key"),
        ColumnSpec("artist_name", "person", "secondary", 0.05),
        ColumnSpec("album_name", "title", "secondary", 0.15),
        ColumnSpec("genre", "category", "secondary"),
        ColumnSpec("price", "number", "secondary", 0.2),
        ColumnSpec("copyright", "noise", "noise", 0.3),
        ColumnSpec("time", "number", "secondary", 0.1),
        ColumnSpec("released", "year", "secondary", 0.1),
    ), 550, 150, 45),
    MultiSpec("BB", "Baby Product", (
        ColumnSpec("title", "title", "key"),
        ColumnSpec("company_struct", "title", "secondary", 0.1),
        ColumnSpec("brand", "category", "secondary", 0.2),
        ColumnSpec("weight", "number", "secondary", 0.3),
        ColumnSpec("length", "number", "secondary", 0.3),
        ColumnSpec("width", "number", "secondary", 0.3),
        ColumnSpec("height", "number", "secondary", 0.3),
        ColumnSpec("fabrics", "category", "secondary", 0.3),
        ColumnSpec("colors", "category", "secondary", 0.2),
        ColumnSpec("materials", "category", "secondary", 0.4),
        ColumnSpec("price", "number", "secondary", 0.2),
        ColumnSpec("is_discounted", "category", "secondary", 0.1),
        ColumnSpec("desc1", "noise", "noise", 0.2),
        ColumnSpec("desc2", "noise", "noise", 0.3),
        ColumnSpec("desc3", "noise", "noise", 0.4),
        ColumnSpec("desc4", "noise", "noise", 0.5),
    ), 600, 100, 40),
)


def spec_names() -> list[str]:
    return [s.name for s in _SPECS]


def get_spec(name: str) -> MultiSpec:
    for s in _SPECS:
        if s.name == name:
            return s
    raise ValueError(f"unknown multi-column dataset {name!r}")


def make_multi_dataset(name: str, *, seed: int = 0) -> FuzzyJoinDataset:
    """Build one multi-column dataset per its spec."""
    spec = get_spec(name)
    rng = np.random.default_rng(seed * 7919 + zlib.crc32(name.encode()) % 10_000)
    cols = spec.columns
    n_entities = spec.n_l + (spec.n_r - spec.n_matches)

    # Entity base attribute values; key-column values made unique so L is
    # a duplicate-free reference table.
    seen_keys: set[tuple] = set()
    entities: list[dict[str, str]] = []
    while len(entities) < n_entities:
        e = {c.name: _gen_base(c.kind, rng) for c in cols}
        key = tuple(e[c.name] for c in cols if c.role == "key")
        if key in seen_keys:
            continue
        seen_keys.add(key)
        entities.append(e)

    # L = first n_l entities, as-is (with missing values applied).
    def _with_missing(val: str, c: ColumnSpec) -> str:
        return "" if rng.random() < c.missing_rate else val

    left_rows = []
    for lid in range(spec.n_l):
        e = entities[lid]
        left_rows.append([lid] + [_with_missing(e[c.name], c) for c in cols])

    # R = reformatted views: matched entities from L + R-only entities.
    match_eids = rng.choice(spec.n_l, size=spec.n_matches, replace=False)
    ronly_eids = np.arange(spec.n_l, n_entities)
    right_rows = []
    gt: dict[int, int | None] = {}
    rid = 0
    for eid in list(match_eids) + list(ronly_eids):
        e = entities[eid]
        row = [rid]
        for c in cols:
            v = _variant(c.kind, e[c.name], rng)
            row.append(_with_missing(v, c))
        right_rows.append(row)
        gt[rid] = int(eid) if eid < spec.n_l else None
        rid += 1

    col_names = [c.name for c in cols]
    return FuzzyJoinDataset(
        name=name,
        left=pd.DataFrame(left_rows, columns=["lid"] + col_names),
        right=pd.DataFrame(right_rows, columns=["rid"] + col_names),
        gt=gt,
        key_cols=col_names,
    )


def all_multi_datasets(seed: int = 0) -> list[FuzzyJoinDataset]:
    return [make_multi_dataset(n, seed=seed) for n in spec_names()]


def add_random_columns(
    ds: FuzzyJoinDataset, n_cols: int = 2, *, seed: int = 0
) -> FuzzyJoinDataset:
    """Table 4(b) robustness: append columns of random 10–50-char strings."""
    rng = np.random.default_rng(seed)
    alphabet = np.array(list("abcdefghijklmnopqrstuvwxyz "))

    def _rand_str() -> str:
        n = int(rng.integers(10, 51))
        return "".join(rng.choice(alphabet, size=n)).strip() or "x"

    left = ds.left.copy()
    right = ds.right.copy()
    new_cols = []
    for i in range(n_cols):
        cname = f"rand_{i}"
        left[cname] = [_rand_str() for _ in range(len(left))]
        right[cname] = [_rand_str() for _ in range(len(right))]
        new_cols.append(cname)
    return FuzzyJoinDataset(
        name=ds.name + "+rand",
        left=left,
        right=right,
        gt=dict(ds.gt),
        key_cols=ds.key_cols + new_cols,
    )

"""Synthetic single-column fuzzy-join benchmark (DBPedia substitute).

Mirrors the paper's construction (§5.1.1): per "entity type", a
duplicate-free reference table L (the 2013 snapshot), an input table R of
name variants from later snapshots (ground truth by entity id,
many-to-one R → L), equi-joins removed, and L incompleteness — a slice of
R belongs to entities absent from L (ground truth ⊥). Ten deterministic
domains cover the variation mix the 50 DBPedia types exhibit: token
drops, typos, suffix swaps, abbreviation, punctuation drift, extraneous
tokens.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass, field
from typing import Callable

import numpy as np
import pandas as pd

from repro.benchgen import perturb as P
from repro.benchgen import vocab as V


@dataclass
class FuzzyJoinDataset:
    """One fuzzy-join task: L (reference), R (input), ground truth.

    ``gt[rid]`` is the lid of the matching reference record, or None when
    the entity is missing from L (``J_G(r) = ⊥``).
    """

    name: str
    left: pd.DataFrame  # columns: lid + key column(s)
    right: pd.DataFrame  # columns: rid + key column(s)
    gt: dict[int, int | None]
    key_cols: list[str] = field(default_factory=lambda: ["value"])

    @property
    def n_gt(self) -> int:
        """Number of R records with a non-⊥ ground-truth match."""
        return sum(1 for v in self.gt.values() if v is not None)


def _roman(n: int) -> str:
    vals = [(50, "L"), (40, "XL"), (10, "X"), (9, "IX"), (5, "V"), (4, "IV"), (1, "I")]
    out = ""
    for v, sym in vals:
        while n >= v:
            out += sym
            n -= v
    return out


# ---------------------------------------------------------------------------
# Domain specs: (entity generator, perturbation menu)
# ---------------------------------------------------------------------------

Perturber = Callable[[str, np.random.Generator], str]


def _team_entities(rng: np.random.Generator, n: int) -> list[str]:
    school_mascot = {s: rng.choice(V.MASCOTS) for s in V.SCHOOLS}
    combos = [(y, s, sp) for y in V.YEARS for s in V.SCHOOLS for sp in V.SPORTS[:6]]
    idx = rng.choice(len(combos), size=min(n, len(combos)), replace=False)
    return [
        f"{combos[i][0]} {combos[i][1]} {school_mascot[combos[i][1]]} {combos[i][2]} team"
        for i in idx
    ]


def _team_perturbers() -> list[Perturber]:
    mascots = set(V.MASCOTS) | {m.rstrip("s") for m in V.MASCOTS}
    return [
        lambda s, g: P.drop_token(s, g, droppable=mascots),
        lambda s, g: P.typo(s, g, protected=set(V.SPORTS) | {"team", "season"}),
        lambda s, g: P.swap_suffix(s, g, pairs=[("team", "season")]),
        lambda s, g: P.typo(P.drop_token(s, g, droppable=mascots), g, protected=set(V.SPORTS)),
        lambda s, g: P.case_punct_drift(s, g),
    ]


def _superbowl_entities(rng: np.random.Generator, n: int) -> list[str]:
    return [f"Super Bowl {_roman(i)} Championship Game" for i in range(1, min(n, 50) + 1)]


def _superbowl_perturbers() -> list[Perturber]:
    return [
        lambda s, g: P.drop_token(s, g, droppable={"Championship"}),
        lambda s, g: P.case_punct_drift(s, g),
        lambda s, g: P.swap_suffix(s, g, pairs=[("Game", "game")]),
        lambda s, g: P.typo(s, g, protected={"Bowl", "Super"}),
    ]


def _politician_entities(rng: np.random.Generator, n: int) -> list[str]:
    out = set()
    while len(out) < n:
        f = rng.choice(V.FIRST_NAMES)
        m = rng.choice(V.FIRST_NAMES)
        last = rng.choice(V.LAST_NAMES)
        out.add(f"{f} {m} {last} (politician)")
    return sorted(out)


def _politician_perturbers() -> list[Perturber]:
    middles = set(V.FIRST_NAMES)
    return [
        lambda s, g: s.replace(" (politician)", ""),
        lambda s, g: P.drop_token(s.replace(" (politician)", ""), g, droppable=middles),
        lambda s, g: P.typo(s, g, protected={"(politician)"}),
        lambda s, g: P.case_punct_drift(s, g),
    ]


def _drug_entities(rng: np.random.Generator, n: int) -> list[str]:
    out = set()
    while len(out) < n:
        p = rng.choice(V.DRUG_PREFIXES)
        s = rng.choice(V.DRUG_SUFFIXES)
        num = rng.integers(10, 99)
        out.add(f"{p}{s}-{num}")
    return sorted(out)


def _drug_perturbers() -> list[Perturber]:
    return [
        lambda s, g: s.replace("-", " "),
        lambda s, g: s.replace("-", ""),
        lambda s, g: (
            P.typo(s.split("-")[0], g) + "-" + s.split("-", 1)[1]
            if "-" in s
            else P.typo(s, g)
        ),
        lambda s, g: s.lower(),
    ]


def _hospital_entities(rng: np.random.Generator, n: int) -> list[str]:
    combos = [(c, k) for c in V.CITIES for k in V.HOSPITAL_KINDS]
    idx = rng.choice(len(combos), size=min(n, len(combos)), replace=False)
    return [f"{combos[i][0]} {combos[i][1]} Hospital" for i in idx]


def _hospital_perturbers() -> list[Perturber]:
    return [
        lambda s, g: P.typo(s, g, protected={"Hospital"}),
        lambda s, g: P.swap_suffix(s, g, pairs=[("Hospital", "Medical Center")]),
        lambda s, g: P.case_punct_drift(s, g),
        lambda s, g: P.add_token(s, g, pool=["The"]),
    ]


def _club_entities(rng: np.random.Generator, n: int) -> list[str]:
    combos = [(y, c) for y in V.YEARS for c in V.CITIES]
    idx = rng.choice(len(combos), size=min(n, len(combos)), replace=False)
    return [f"{combos[i][0]}-{combos[i][0] % 100 + 1:02d} {combos[i][1]} FC season" for i in idx]


def _club_perturbers() -> list[Perturber]:
    return [
        lambda s, g: s.replace("FC", "F.C."),
        lambda s, g: P.drop_token(s, g, droppable={"season"}),
        lambda s, g: P.typo(s, g, protected={"FC", "season"}),
        lambda s, g: P.case_punct_drift(s, g),
    ]


def _song_entities(rng: np.random.Generator, n: int) -> list[str]:
    out = set()
    while len(out) < n:
        w1, w2 = rng.choice(V.SONG_WORDS, 2, replace=False)
        artist = rng.choice(V.ARTISTS)
        out.add(f"{w1} {w2} ({artist} song)")
    return sorted(out)


def _song_perturbers() -> list[Perturber]:
    return [
        lambda s, g: s.split(" (")[0] + " (song)",
        lambda s, g: P.typo(s, g),
        lambda s, g: P.case_punct_drift(s, g),
        lambda s, g: s.replace(" song)", ")"),
    ]


def _stadium_entities(rng: np.random.Generator, n: int) -> list[str]:
    combos = [(nm, k, c) for nm in V.STADIUM_NAMES for k in V.STADIUM_KINDS for c in V.CITIES[:20]]
    idx = rng.choice(len(combos), size=min(n, len(combos)), replace=False)
    return [f"{combos[i][0]} {combos[i][1]} ({combos[i][2]})" for i in idx]


def _stadium_perturbers() -> list[Perturber]:
    return [
        lambda s, g: s.split(" (")[0],
        lambda s, g: P.typo(s, g, protected=set(V.STADIUM_KINDS)),
        lambda s, g: P.case_punct_drift(s, g),
    ]


def _award_entities(rng: np.random.Generator, n: int) -> list[str]:
    combos = [
        (y, o, c) for y in V.YEARS for o in V.AWARD_ORGS for c in V.AWARD_CATEGORIES
    ]
    idx = rng.choice(len(combos), size=min(n, len(combos)), replace=False)
    return [f"{combos[i][0]} {combos[i][1]} Award for Best {combos[i][2]}" for i in idx]


def _award_perturbers() -> list[Perturber]:
    return [
        lambda s, g: P.drop_token(s, g, droppable={"Best"}),
        lambda s, g: P.typo(s, g, protected={"Award", "Best"}),
        lambda s, g: P.case_punct_drift(s, g),
        lambda s, g: P.swap_suffix(s, g, pairs=[("Award", "Prize")]),
    ]


def _satellite_entities(rng: np.random.Generator, n: int) -> list[str]:
    out = set()
    names = V.PRODUCT_BRANDS + V.STADIUM_NAMES
    while len(out) < n:
        nm = rng.choice(names)
        num = rng.integers(1, 40)
        letter = rng.choice(list("ABCDEF"))
        out.add(f"{nm}-{num}{letter} satellite")
    return sorted(out)


def _satellite_perturbers() -> list[Perturber]:
    return [
        lambda s, g: s.replace("-", " "),
        lambda s, g: P.drop_token(s, g, droppable={"satellite"}),
        lambda s, g: P.typo(s, g, protected={"satellite"}),
        lambda s, g: s.lower(),
    ]


_DOMAINS: list[tuple[str, Callable, Callable, int]] = [
    # (name, entity generator, perturber menu, n_entities)
    ("TeamSeasons", _team_entities, _team_perturbers, 700),
    ("SuperBowlGames", _superbowl_entities, _superbowl_perturbers, 50),
    ("Politicians", _politician_entities, _politician_perturbers, 500),
    ("Drugs", _drug_entities, _drug_perturbers, 400),
    ("Hospitals", _hospital_entities, _hospital_perturbers, 380),
    ("SoccerClubSeasons", _club_entities, _club_perturbers, 600),
    ("Songs", _song_entities, _song_perturbers, 450),
    ("Stadiums", _stadium_entities, _stadium_perturbers, 550),
    ("Awards", _award_entities, _award_perturbers, 650),
    # Deliberately small (the paper's R sizes span 10–1161; small datasets
    # starve the supervised 50 %-label baselines).
    ("Satellites", _satellite_entities, _satellite_perturbers, 120),
]


def dataset_names() -> list[str]:
    return [d[0] for d in _DOMAINS]


def make_dataset(
    name: str,
    *,
    seed: int = 0,
    l_coverage: float = 0.8,
    r_fraction: float = 0.45,
    max_variants: int = 2,
    n_entities: int | None = None,
    compound_rate: float = 0.5,
    alias_rate: float = 0.08,
) -> FuzzyJoinDataset:
    """Build one single-column dataset.

    ``l_coverage``: fraction of entities present in L (rest are R-only,
    ground truth ⊥). ``r_fraction``: fraction of entities contributing R
    variants (1..max_variants each). Equi-joins (variant == canonical)
    are removed, as in the paper. A perturbed string colliding with a
    *different* entity's canonical name is discarded (it would corrupt
    ground truth).
    """
    spec = next((d for d in _DOMAINS if d[0] == name), None)
    if spec is None:
        raise ValueError(f"unknown dataset {name!r}; see dataset_names()")
    _, gen_entities, gen_perturbers, default_n = spec
    n_entities = n_entities if n_entities is not None else default_n
    # zlib.crc32 (not hash()) — builtin hash is salted per process and
    # would make the benchmark non-deterministic across runs.
    rng = np.random.default_rng(seed * 9973 + zlib.crc32(name.encode()) % 10_000)
    entities = gen_entities(rng, n_entities)
    canon = set(entities)
    perturbers = gen_perturbers()

    n_in_l = int(round(len(entities) * l_coverage))
    order = rng.permutation(len(entities))
    in_l = set(order[:n_in_l].tolist())

    left_rows = [(lid, entities[eid]) for lid, eid in enumerate(sorted(in_l))]
    eid_to_lid = {eid: lid for lid, (eid) in enumerate(sorted(in_l))}

    right_rows: list[tuple[int, str]] = []
    gt: dict[int, int | None] = {}
    rid = 0
    seen_r: set[str] = set()
    for eid in range(len(entities)):
        if rng.random() > r_fraction:
            continue
        base = entities[eid]
        n_var = int(rng.integers(1, max_variants + 1))
        for _ in range(n_var):
            if rng.random() < alias_rate:
                # Semantic alias (renamed entity): ground truth still
                # points at L, but no string function can bridge it —
                # mirrors the paper's infeasible pairs like
                # ("Lita (wrestler)", "Amy Dumas") that cap UBR at 0.834.
                alias = " ".join(
                    rng.choice(V.FIRST_NAMES + V.SONG_WORDS + V.CITIES, size=3, replace=False)
                )
                if alias not in canon and alias not in seen_r:
                    seen_r.add(alias)
                    right_rows.append((rid, alias))
                    gt[rid] = eid_to_lid.get(eid)
                    rid += 1
                continue
            # Mixed variation types (paper §2.2: typos AND missing tokens
            # AND extraneous info co-occur): with probability
            # ``compound_rate`` chain two distinct perturbations, so no
            # single static configuration covers the whole dataset.
            k = 2 if rng.random() < compound_rate and len(perturbers) > 1 else 1
            picks = rng.choice(len(perturbers), size=k, replace=False)
            variant = base
            for pi in picks:
                variant = perturbers[int(pi)](variant, rng)
            if variant == base or not variant.strip():
                continue  # equi-join or degenerate — removed (paper §5.1.1)
            if variant in canon and variant != base:
                continue  # would collide with another entity's exact name
            if variant in seen_r:
                continue
            seen_r.add(variant)
            right_rows.append((rid, variant))
            gt[rid] = eid_to_lid.get(eid)
            rid += 1

    return FuzzyJoinDataset(
        name=name,
        left=pd.DataFrame(left_rows, columns=["lid", "value"]),
        right=pd.DataFrame(right_rows, columns=["rid", "value"]),
        gt=gt,
    )


def all_datasets(seed: int = 0, **kwargs) -> list[FuzzyJoinDataset]:
    """All 10 single-column benchmark datasets."""
    return [make_dataset(n, seed=seed, **kwargs) for n in dataset_names()]

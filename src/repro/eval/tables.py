"""Suite runners + table formatting for the reproduction jobs.

``run_single_column_suite`` / ``run_multi_column_suite`` evaluate every
benchmark dataset and cache the reports (pickle under ``results/``) so
the PR-AUC tables (5, 7) and the main tables (2, 4) share one expensive
pass. Formatters emit the paper's table layouts as plain text.
"""
from __future__ import annotations

import math
import pickle
from pathlib import Path

import numpy as np
from pyspark.sql import SparkSession

from repro.benchgen.multi_column import make_multi_dataset, spec_names
from repro.benchgen.single_column import dataset_names, make_dataset
from repro.core.config_space import full_space, reduced_space
from repro.eval.harness import SUPERVISED, UNSUPERVISED, DatasetReport, evaluate_dataset
from repro.eval.metrics import adjusted_recall, pr_auc
from repro.eval.multi_harness import MultiReport, evaluate_multi_dataset

RESULTS_DIR = Path(__file__).resolve().parents[3] / "results"

METHODS = list(UNSUPERVISED) + list(SUPERVISED)


def _cache_path(tag: str) -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR / f"{tag}.pkl"


def run_single_column_suite(
    spark: SparkSession,
    *,
    tau: float = 0.9,
    s: int = 50,
    seed: int = 0,
    scale: float = 1.0,
    reduced: bool = False,
    tag: str | None = None,
    use_cache: bool = True,
) -> list[DatasetReport]:
    """Evaluate all single-column datasets; cache under ``tag``."""
    tag = tag or ("single_reduced" if reduced else "single_full")
    path = _cache_path(tag)
    if use_cache and path.exists():
        with open(path, "rb") as f:
            return pickle.load(f)
    if reduced:
        keep = {f.name for f in reduced_space(24)}
        space = [f for f in full_space() if f.name in keep]
    else:
        space = full_space()
    reports = []
    for name in dataset_names():
        ds = make_dataset(name, seed=seed)
        if scale != 1.0:
            ds = make_dataset(
                name, seed=seed,
                n_entities=max(30, int(_default_entities(name) * scale)),
            )
        rep = evaluate_dataset(spark, ds, tau=tau, s=s, seed=seed, fns=space)
        reports.append(rep)
        print(f"  [{name}] P={rep.autofj_precision:.3f} R={rep.autofj_recall:.3f}")
    with open(path, "wb") as f:
        pickle.dump(reports, f)
    return reports


def _default_entities(name: str) -> int:
    from repro.benchgen.single_column import _DOMAINS

    return next(d[3] for d in _DOMAINS if d[0] == name)


def run_multi_column_suite(
    spark: SparkSession,
    *,
    tau: float = 0.9,
    s: int = 50,
    g: int = 10,
    seed: int = 0,
    tag: str = "multi",
    use_cache: bool = True,
) -> list[MultiReport]:
    tag_path = _cache_path(tag)
    if use_cache and tag_path.exists():
        with open(tag_path, "rb") as f:
            return pickle.load(f)
    reports = []
    for name in spec_names():
        ds = make_multi_dataset(name, seed=seed)
        rep = evaluate_multi_dataset(spark, ds, tau=tau, s=s, g=g, seed=seed)
        reports.append(rep)
        print(
            f"  [{name}] P={rep.autofj_precision:.3f} R={rep.autofj_recall:.3f} "
            f"cols={rep.selected} w={ {k: round(v,2) for k,v in rep.weights.items()} }"
        )
    with open(tag_path, "wb") as f:
        pickle.dump(reports, f)
    return reports


# ---------------------------------------------------------------------------
# Formatting
# ---------------------------------------------------------------------------

def _fmt(x: float | None) -> str:
    if x is None or (isinstance(x, float) and math.isnan(x)):
        return "  NA"
    return f"{x:.3f}"


def pick_best_static(reports: list[DatasetReport]) -> int:
    """Global BSJ: join-function index with best average adjusted recall."""
    n_fn = len(reports[0].bsj_curves)
    avg = np.zeros(n_fn)
    for rep in reports:
        for j in range(n_fn):
            avg[j] += adjusted_recall(rep.bsj_curves[j], rep.autofj_precision)
    return int(np.argmax(avg))


def format_table2(reports: list[DatasetReport]) -> str:
    bsj = pick_best_static(reports)
    header = (
        f"{'Dataset':<18} {'Size(L-R)':>11} {'UBR':>6} {'PEPCC':>6} {'RERCC':>6} "
        f"{'P':>6} {'R':>6} {'BSJ':>6} "
        + " ".join(f"{m:>8}" for m in METHODS)
        + f" {'AFJ-UC':>7} {'AFJ-NR':>7}"
    )
    lines = [header, "-" * len(header)]
    sums: dict[str, list[float]] = {}

    def add(key: str, v: float):
        if not (isinstance(v, float) and math.isnan(v)):
            sums.setdefault(key, []).append(v)

    for rep in reports:
        bsj_ar = adjusted_recall(rep.bsj_curves[bsj], rep.autofj_precision)
        row = (
            f"{rep.name:<18} {f'{rep.n_l}-{rep.n_r}':>11} {_fmt(rep.ubr):>6} "
            f"{_fmt(rep.pepcc):>6} {_fmt(rep.rercc):>6} "
            f"{_fmt(rep.autofj_precision):>6} {_fmt(rep.autofj_recall):>6} "
            f"{_fmt(bsj_ar):>6} "
            + " ".join(f"{_fmt(rep.ar(m)):>8}" for m in METHODS)
            + f" {_fmt(rep.uc_recall):>7} {_fmt(rep.nr_recall):>7}"
        )
        lines.append(row)
        add("UBR", rep.ubr)
        add("PEPCC", rep.pepcc)
        add("RERCC", rep.rercc)
        add("P", rep.autofj_precision)
        add("R", rep.autofj_recall)
        add("BSJ", bsj_ar)
        for m in METHODS:
            add(m, rep.ar(m))
        add("UC", rep.uc_recall)
        add("NR", rep.nr_recall)
    keys = ["UBR", "PEPCC", "RERCC", "P", "R", "BSJ", "UC", "NR", *METHODS]
    avg = {k: (float(np.mean(sums[k])) if sums.get(k) else float("nan")) for k in keys}
    lines.append("-" * len(header))
    lines.append(
        f"{'Average':<18} {'':>11} {_fmt(avg['UBR']):>6} {_fmt(avg['PEPCC']):>6} "
        f"{_fmt(avg['RERCC']):>6} {_fmt(avg['P']):>6} {_fmt(avg['R']):>6} "
        f"{_fmt(avg['BSJ']):>6} "
        + " ".join(f"{_fmt(avg[m]):>8}" for m in METHODS)
        + f" {_fmt(avg['UC']):>7} {_fmt(avg['NR']):>7}"
    )
    return "\n".join(lines)


def format_prauc_table(reports: list[DatasetReport]) -> str:
    """Table 5: PR-AUC per dataset/method (+ BSJ as a method)."""
    bsj = pick_best_static(reports)
    header = f"{'Dataset':<18} {'AutoFJ':>7} {'BSJ':>7} " + " ".join(
        f"{m:>8}" for m in METHODS
    )
    lines = [header, "-" * len(header)]
    acc: dict[str, list[float]] = {}
    for rep in reports:
        bsj_auc = pr_auc(rep.bsj_curves[bsj])
        lines.append(
            f"{rep.name:<18} {_fmt(rep.autofj_auc):>7} {_fmt(bsj_auc):>7} "
            + " ".join(f"{_fmt(rep.auc(m)):>8}" for m in METHODS)
        )
        acc.setdefault("AutoFJ", []).append(rep.autofj_auc)
        acc.setdefault("BSJ", []).append(bsj_auc)
        for m in METHODS:
            acc.setdefault(m, []).append(rep.auc(m))
    lines.append("-" * len(header))
    lines.append(
        f"{'Average':<18} {_fmt(np.mean(acc['AutoFJ'])):>7} {_fmt(np.mean(acc['BSJ'])):>7} "
        + " ".join(f"{_fmt(np.mean(acc[m])):>8}" for m in METHODS)
    )
    return "\n".join(lines)


def format_table4a(reports: list[MultiReport]) -> str:
    header = (
        f"{'Dataset':<8} {'Columns(w)':<42} {'P':>6} {'R':>6} "
        + " ".join(f"{m:>8}" for m in METHODS)
    )
    lines = [header, "-" * len(header)]
    acc: dict[str, list[float]] = {}
    for rep in reports:
        colw = ", ".join(f"{c}:{w:.1f}" for c, w in rep.weights.items())
        lines.append(
            f"{rep.name:<8} {colw:<42.42} {_fmt(rep.autofj_precision):>6} "
            f"{_fmt(rep.autofj_recall):>6} "
            + " ".join(f"{_fmt(rep.ar(m)):>8}" for m in METHODS)
        )
        acc.setdefault("P", []).append(rep.autofj_precision)
        acc.setdefault("R", []).append(rep.autofj_recall)
        for m in METHODS:
            acc.setdefault(m, []).append(rep.ar(m))
    lines.append("-" * len(header))
    lines.append(
        f"{'Average':<8} {'':<42} {_fmt(np.mean(acc['P'])):>6} {_fmt(np.mean(acc['R'])):>6} "
        + " ".join(f"{_fmt(np.mean(acc[m])):>8}" for m in METHODS)
    )
    return "\n".join(lines)


def format_multi_prauc(reports: list[MultiReport]) -> str:
    header = f"{'Dataset':<8} {'AutoFJ':>7} " + " ".join(f"{m:>8}" for m in METHODS)
    lines = [header, "-" * len(header)]
    acc: dict[str, list[float]] = {}
    for rep in reports:
        lines.append(
            f"{rep.name:<8} {_fmt(rep.autofj_auc):>7} "
            + " ".join(f"{_fmt(rep.auc(m)):>8}" for m in METHODS)
        )
        acc.setdefault("AutoFJ", []).append(rep.autofj_auc)
        for m in METHODS:
            acc.setdefault(m, []).append(rep.auc(m))
    lines.append("-" * len(header))
    lines.append(
        f"{'Average':<8} {_fmt(np.mean(acc['AutoFJ'])):>7} "
        + " ".join(f"{_fmt(np.mean(acc[m])):>8}" for m in METHODS)
    )
    return "\n".join(lines)

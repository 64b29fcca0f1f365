"""Bipartite matching algorithms for Clean-Clean unsupervised ER.

* **UMC** — Unique Mapping Clustering [Lacoste-Julien+ 2013], the paper's
  primary algorithm: scan candidate pairs in descending similarity, match a
  pair when both sides are still free, stop when the smaller source is
  exhausted or similarities fall below the threshold δ.
* **EXC** — Exact Clustering: match ⟨a, b⟩ iff they are mutually each
  other's best candidate.
* **KRC** — Kiraly Clustering: linear-time 2-approximation of maximum stable
  marriage via one proposal round per free left entity (simplified from
  [40]; the paper only uses it to corroborate UMC's rankings).

These run on the driver over the (pruned) candidate list — after blocking the
pair set is a few million rows at most, and greedy matching is inherently
sequential. The δ-sweep exploits that a threshold only *truncates* UMC's
greedy order: ``UMC(δ)`` = matches of ``UMC(0)`` with sim ≥ δ, so one run
serves the whole sweep (exact, not approximate — see DESIGN.md §5).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.metrics import prf


def _sorted_pairs(pairs: pd.DataFrame) -> pd.DataFrame:
    # deterministic order: descending sim, then ids as tie-breakers
    return pairs.sort_values(["sim", "id1", "id2"],
                             ascending=[False, True, True], kind="mergesort")


def umc(pairs: pd.DataFrame, *, n_left: int | None = None,
        delta: float = 0.0) -> pd.DataFrame:
    """Unique Mapping Clustering over DF(id1, id2, sim) → matched subset.

    ``n_left`` enables the early-exit once every left-side entity is matched
    (the paper's "all entities from the smallest dataset have been matched").
    """
    sp = _sorted_pairs(pairs[pairs["sim"] >= delta])
    a1 = sp["id1"].to_numpy()
    a2 = sp["id2"].to_numpy()
    used1: set = set()
    used2: set = set()
    keep = np.zeros(len(sp), dtype=bool)
    limit = n_left if n_left is not None else np.inf
    for i in range(len(sp)):
        if len(used1) >= limit:
            break
        x, y = a1[i], a2[i]
        if x not in used1 and y not in used2:
            used1.add(x)
            used2.add(y)
            keep[i] = True
    return sp[keep]


def exact_clustering(pairs: pd.DataFrame, *, delta: float = 0.0) -> pd.DataFrame:
    """Match pairs that are mutually best (reciprocal top-1) with sim ≥ δ."""
    p = pairs[pairs["sim"] >= delta]
    if p.empty:
        return p
    best1 = _sorted_pairs(p).drop_duplicates("id1")
    best2 = _sorted_pairs(p).drop_duplicates("id2")
    return best1.merge(best2[["id1", "id2"]], on=["id1", "id2"], how="inner")


def kiraly(pairs: pd.DataFrame, *, delta: float = 0.0) -> pd.DataFrame:
    """Simplified Kiraly: left entities propose best-first; right entities
    accept a proposal that beats their current partner (one pass over the
    descending-similarity order, allowing re-matching of the right side)."""
    sp = _sorted_pairs(pairs[pairs["sim"] >= delta])
    left_match: dict = {}
    right_match: dict = {}
    right_sim: dict = {}
    for x, y, s in zip(sp["id1"].to_numpy(), sp["id2"].to_numpy(),
                       sp["sim"].to_numpy()):
        if x in left_match:
            continue
        if y not in right_match:
            left_match[x] = y
            right_match[y] = x
            right_sim[y] = s
        elif s > right_sim[y]:
            old = right_match[y]
            del left_match[old]
            left_match[x] = y
            right_match[y] = x
            right_sim[y] = s
    out = pd.DataFrame({
        "id1": list(left_match.keys()),
        "id2": list(left_match.values()),
    })
    return out.merge(sp, on=["id1", "id2"], how="left")


def sweep(matches: pd.DataFrame, gt: pd.DataFrame,
          thresholds: np.ndarray | None = None) -> pd.DataFrame:
    """δ-sweep via the prefix property → DF(delta, precision, recall, f1).

    ``matches`` must be a UMC/EXC output (id1, id2, sim); ``gt`` holds the
    true pairs. Every δ keeps the matches with sim ≥ δ.
    """
    if thresholds is None:
        thresholds = np.round(np.arange(0.05, 1.0, 0.05), 2)
    m = matches.sort_values("sim", ascending=False, kind="mergesort")
    gt_set = set(zip(gt["id1"], gt["id2"]))
    is_hit = np.fromiter(
        ((a, b) in gt_set for a, b in zip(m["id1"], m["id2"])),
        dtype=bool, count=len(m))
    hits_cum = np.concatenate([[0], np.cumsum(is_hit)])
    sims = m["sim"].to_numpy()
    n_true = len(gt_set)
    rows = []
    for d in thresholds:
        n_keep = int(np.searchsorted(-sims, -d, side="right"))
        p, r, f = prf(n_keep, n_true, int(hits_cum[n_keep]))
        rows.append((float(d), p, r, f))
    return pd.DataFrame(rows, columns=["delta", "precision", "recall", "f1"])


def best_f1(matches: pd.DataFrame, gt: pd.DataFrame,
            thresholds: np.ndarray | None = None) -> dict:
    """Optimal row of the δ-sweep (the paper tunes δ for max F1)."""
    sw = sweep(matches, gt, thresholds)
    row = sw.loc[sw["f1"].idxmax()]
    return {"delta": float(row["delta"]), "precision": float(row["precision"]),
            "recall": float(row["recall"]), "f1": float(row["f1"])}

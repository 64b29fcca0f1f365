"""Febrl-style synthetic Dirty-ER datasets (paper Table 2b).

The paper's scalability datasets were generated with Febrl: census-style
person records (names + addresses drawn from frequency tables), then
duplicates created with realistic error types. We re-implement the recipe:

* 40% of all entities belong to a duplicate cluster;
* at most 9 duplicates per record (cluster size ≤ 10);
* ≤ 3 modifications per attribute value, ≤ 10 per record;
* cluster sizes follow ``s^-1.5`` over {2..10}, which yields
  ``|D| ≈ 0.86·n`` intra-cluster pairs — matching the paper's |D| column
  (e.g. 8,705 pairs for 10K entities).

Columns: ``id``, ``cluster`` (ground-truth cluster id; -1 for singletons) and
12 attributes; ground truth = all intra-cluster pairs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.data import vocab as V

ATTRS = [
    "given_name", "surname", "street_number", "address_1", "address_2",
    "suburb", "postcode", "state", "date_of_birth", "age", "phone_number",
    "soc_sec_id",
]

_SIZES = np.arange(2, 11)
_SIZE_P = (_SIZES ** -1.5) / (_SIZES ** -1.5).sum()


def _clean_record(g: np.random.Generator) -> list[str]:
    dob_y = int(g.integers(1930, 2000))
    return [
        V.FIRST_NAMES[int(g.integers(0, len(V.FIRST_NAMES)))],
        V.LAST_NAMES[int(g.integers(0, len(V.LAST_NAMES)))],
        str(int(g.integers(1, 400))),
        f"{V.STREETS[int(g.integers(0, len(V.STREETS)))]} "
        f"{['street', 'road', 'avenue', 'lane', 'place'][int(g.integers(0, 5))]}",
        V.SUBURBS[int(g.integers(0, len(V.SUBURBS)))] if g.random() < 0.3 else "",
        V.SUBURBS[int(g.integers(0, len(V.SUBURBS)))],
        str(int(g.integers(2000, 7999))),
        V.STATES[int(g.integers(0, len(V.STATES)))],
        f"{dob_y}{int(g.integers(1, 13)):02d}{int(g.integers(1, 29)):02d}",
        str(2020 - dob_y),
        f"0{int(g.integers(2, 9))} {int(g.integers(1000, 9999))} {int(g.integers(1000, 9999))}",
        str(int(g.integers(10 ** 6, 10 ** 7))),
    ]


def _duplicate(rec: list[str], g: np.random.Generator) -> list[str]:
    """Corrupt a record Febrl-style: ≤3 mods per attribute, ≤10 per record."""
    out = list(rec)
    budget = 10
    order = g.permutation(len(out))
    for i in order:
        if budget <= 0:
            break
        if not out[i] or g.random() > 0.40:
            continue
        n_mods = int(g.integers(1, 3))
        toks = out[i].split()
        for _ in range(min(n_mods, budget)):
            j = int(g.integers(0, len(toks)))
            r = g.random()
            if r < 0.7:
                toks[j] = V.typo(toks[j], g)
            elif r < 0.85 and len(toks) > 1:
                toks.pop(j)
            elif len(toks[j]) > 2:
                toks[j] = toks[j][0] + "."
            budget -= 1
            if not toks:
                break
        out[i] = " ".join(toks)
    return out


def generate_pandas(n: int, *, seed: int = 0) -> tuple[pd.DataFrame, pd.DataFrame]:
    """``n`` person records → (records, ground-truth pairs)."""
    g = np.random.default_rng(seed)
    target_matched = int(0.4 * n)
    sizes = []
    tot = 0
    while tot < target_matched:
        s = int(g.choice(_SIZES, p=_SIZE_P))
        s = min(s, target_matched - tot) if target_matched - tot < 2 else s
        s = max(s, 2)
        sizes.append(s)
        tot += s
    n_singleton = n - tot

    rows: list[list[str]] = []
    clusters: list[int] = []
    for cid, s in enumerate(sizes):
        base = _clean_record(g)
        rows.append(base)
        clusters.append(cid)
        for _ in range(s - 1):
            rows.append(_duplicate(base, g))
            clusters.append(cid)
    for _ in range(n_singleton):
        rows.append(_clean_record(g))
        clusters.append(-1)

    df = pd.DataFrame(rows, columns=ATTRS)
    df.insert(0, "cluster", clusters)
    df.insert(0, "id", np.arange(len(df)))
    # shuffle so duplicates are not adjacent (blocking must find them)
    df = df.sample(frac=1.0, random_state=seed).reset_index(drop=True)
    df["id"] = np.arange(len(df))

    grp = df[df["cluster"] >= 0].groupby("cluster")["id"].apply(list)
    pairs = [(min(a, b), max(a, b))
             for ids in grp for i, a in enumerate(ids) for b in ids[i + 1:]]
    gt = pd.DataFrame(pairs, columns=["id1", "id2"])
    return df, gt


def generate(spark: SparkSession, n: int, *, seed: int = 0) -> tuple[DataFrame, DataFrame]:
    df, gt = generate_pandas(n, seed=seed)
    return spark.createDataFrame(df), spark.createDataFrame(gt)

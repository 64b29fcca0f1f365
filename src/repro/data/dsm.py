"""Supervised-matching datasets DSM1–DSM5 (paper Table 3).

Each dataset is a set of labelled candidate pairs with the paper's counts
(total pairs, duplicates, attributes) and the standard 60/20/20
train/validation/test split. Positives are two noisy renderings of the same
clean object; negatives are *hard* negatives — sibling objects sharing the
brand / title vocabulary — which is what blocking would feed a matcher.

Per the paper: DSM3/DSM4 (bibliographic) are relatively clean and easy, while
DSM1/DSM2/DSM5 carry product/music terminology and typos, where character
information matters (FastText > GloVe) and fine-tuned dynamic models shine.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.data import vocab as V
from repro.data.er_datasets import (
    NoiseProfile,
    _FACTORIES,
    _FIELD_ORDER,
    _render,
    DatasetSpec,
)


@dataclass(frozen=True)
class DSMSpec:
    name: str
    domain: str
    total_pairs: int
    duplicates: int
    attrs: int
    desc_words: int
    noise: NoiseProfile
    sibling_fields: tuple[str, ...]  # fields mutated to build hard negatives
    seed: int


DSM: dict[str, DSMSpec] = {
    s.name: s
    for s in [
        DSMSpec("DSM1", "product", 9575, 1028, 3, 18,
                NoiseProfile(typo=0.06),
                ("name", "description", "price"), 201),
        DSMSpec("DSM2", "music", 539, 132, 8, 0,
                NoiseProfile(typo=0.06),
                ("title", "price"), 202),
        DSMSpec("DSM3", "bib", 12363, 2220, 4, 0,
                NoiseProfile(typo=0.01, misplace=0.05),
                ("title", "year"), 203),
        DSMSpec("DSM4", "bib", 28707, 5347, 4, 0,
                NoiseProfile(typo=0.03, abbrev=0.04, misplace=0.03),
                ("title", "authors"), 204),
        DSMSpec("DSM5", "product", 10242, 962, 5, 6,
                NoiseProfile(typo=0.10),
                ("name", "price"), 205),
    ]
}


def _make_music(g: np.random.Generator) -> dict:
    nt = int(g.integers(2, 5))
    title = " ".join(V.MOVIE_WORDS[int(g.integers(0, len(V.MOVIE_WORDS)))]
                     for _ in range(nt))
    artist = (f"{V.FIRST_NAMES[int(g.integers(0, len(V.FIRST_NAMES)))]} "
              f"{V.LAST_NAMES[int(g.integers(0, len(V.LAST_NAMES)))]}")
    return {
        "title": title + (" " + V.MUSIC_WORDS[int(g.integers(0, len(V.MUSIC_WORDS)))]
                          if g.random() < 0.5 else ""),
        "artist": artist,
        "album": " ".join(V.MOVIE_WORDS[int(g.integers(0, len(V.MOVIE_WORDS)))]
                          for _ in range(2)),
        "genre": V.GENRES[int(g.integers(0, len(V.GENRES)))],
        "price": str(round(float(g.random() * 2 + 0.5), 2)),
        "copyright": str(int(g.integers(1990, 2021))),
        "time": f"{int(g.integers(2, 6))}:{int(g.integers(0, 60)):02d}",
        "released": str(int(g.integers(1990, 2021))),
    }


_FACTORIES["music"] = lambda g, spec: _make_music(g)
_FIELD_ORDER["music"] = ["title", "artist", "album", "genre", "price",
                         "copyright", "time", "released"]


def _sibling(obj: dict, domain: str, fields: tuple[str, ...],
             g: np.random.Generator, spec: DatasetSpec) -> dict:
    """A near-duplicate *different* object — the hard negatives blocking
    would produce. Distinguishing fields are *minimally* mutated (one token
    swapped, a digit changed, a variant suffix added), so separating them
    from true duplicates requires fine-grained/terminology awareness — the
    regime where the paper's static models fall behind."""
    other = _FACTORIES[domain](g, spec)
    out = dict(obj)
    for f in fields:
        toks = str(obj[f]).split()
        o_toks = str(other[f]).split()
        if not toks or not o_toks:
            out[f] = other[f]
            continue
        r = g.random()
        if r < 0.45:  # swap tokens with the sibling's (more for long fields —
            # two different paper titles differ in several words, two product
            # names usually in one)
            for _ in range(max(1, len(toks) // 4)):
                toks[int(g.integers(0, len(toks)))] = o_toks[int(g.integers(0, len(o_toks)))]
        elif r < 0.70:  # append a variant marker (remix / 4k / v2 ...)
            toks.append(o_toks[-1])
        elif r < 0.85 and any(c.isdigit() for t in toks for c in t):
            # a different model number in the same family: redraw the digits
            toks = [("".join(c if not c.isdigit()
                             else str(int(g.integers(0, 10))) for c in t))
                    if any(c.isdigit() for c in t) else t for t in toks]
        else:  # different value entirely (price, year, ...)
            toks = o_toks
        out[f] = " ".join(toks)
    return out


def generate_pandas(name: str) -> pd.DataFrame:
    """DSM dataset → pandas DF with ``left_attr*``, ``right_attr*``,
    ``label`` (1=duplicate) and ``split`` ∈ {train, valid, test}."""
    s = DSM[name]
    g = np.random.default_rng(s.seed)
    # reuse the Clean-Clean renderer via a minimal DatasetSpec shim
    shim = DatasetSpec(s.name, s.domain, 0, 0, s.attrs, s.attrs, 0,
                       desc_words=s.desc_words, pool_frac=0.4)
    rows = []
    n_neg = s.total_pairs - s.duplicates
    clean = NoiseProfile(typo=0.01)
    for label, count in ((1, s.duplicates), (0, n_neg)):
        for _ in range(count):
            left_obj = _FACTORIES[s.domain](g, shim)
            if label == 1:
                right_obj = left_obj
            else:
                right_obj = _sibling(left_obj, s.domain, s.sibling_fields, g, shim)
            # duplicates differ by rendering noise (typos — recoverable from
            # character information); negatives differ by word identity (a
            # sibling product). Both sides render without numeric jitter so
            # price/ids are a clean signal, as in the real pair datasets.
            lv = _render(left_obj, shim, s.attrs, clean, g, volatile=False)
            rv = _render(right_obj, shim, s.attrs, s.noise, g, volatile=False)
            rows.append(lv + rv + [label])
    cols = ([f"left_attr{i+1}" for i in range(s.attrs)]
            + [f"right_attr{i+1}" for i in range(s.attrs)] + ["label"])
    df = pd.DataFrame(rows, columns=cols)
    df = df.sample(frac=1.0, random_state=s.seed).reset_index(drop=True)
    n = len(df)
    split = np.full(n, "train", dtype=object)
    split[int(0.6 * n): int(0.8 * n)] = "valid"
    split[int(0.8 * n):] = "test"
    df["split"] = split
    df["pair_id"] = np.arange(n)
    return df


def sentences(df: pd.DataFrame, side: str) -> pd.Series:
    """Schema-agnostic sentence for one side ('left' or 'right')."""
    cols = [c for c in df.columns if c.startswith(f"{side}_attr")]
    return (df[cols].astype(str).agg(" ".join, axis=1)
            .str.replace(r"\s+", " ", regex=True).str.strip())

"""Synthetic equivalents of the paper's ten real Clean-Clean ER datasets.

The originals (Table 2a) are CSVs from Zenodo; offline we regenerate each
dataset to match its measured characteristics: entity counts |V1|/|V2|,
attribute counts |A1|/|A2|, duplicate count |D|, average sentence length, and
a per-dataset noise profile that drives the paper's per-dataset findings
(FastText leads the static models on typo/terminology-heavy D1/D8/D9, ZeroER
collapses on D1's missing+misplaced values, D10 is extremely noisy, D4 is
clean-and-easy, ...).

Generation recipe: build ``|V1| + |V2| − |D|`` clean "real-world objects" for
the dataset's domain, place the first |D| of them in both sources, then render
every object per source with source-specific formatting and noise. Rendering
is deterministic in the dataset seed.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.data import vocab as V


@dataclass(frozen=True)
class NoiseProfile:
    """Per-source corruption applied when rendering an object."""

    typo: float = 0.0        # per-token char-edit probability
    drop_tok: float = 0.0    # per-token deletion probability
    abbrev: float = 0.0      # per-token abbreviation probability
    missing: float = 0.0     # per-attribute missing-value probability
    misplace: float = 0.0    # per-record attribute-swap probability
    paraphrase: float = 0.0  # per-token resample probability in long fields
                             # (two shops describe one product differently)


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    domain: str              # restaurant | product | bib | movie
    n1: int
    n2: int
    attrs1: int
    attrs2: int
    n_dups: int
    desc_words: int = 0      # product description length (words)
    pool_frac: float = 1.0   # vocabulary-pool truncation: smaller pools give
                             # more look-alike non-matches (harder blocking)
    noise1: NoiseProfile = field(default_factory=NoiseProfile)
    noise2: NoiseProfile = field(default_factory=NoiseProfile)
    seed: int = 0
    paper_avg_len: float = 0.0


#: Table 2(a), as DatasetSpecs. `paper_avg_len` is the |S̄| column.
DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("D1", "restaurant", 339, 2256, 7, 7, 89,
                    noise1=NoiseProfile(typo=0.10, missing=0.90, misplace=0.20),
                    noise2=NoiseProfile(typo=0.06, missing=0.92, misplace=0.15),
                    seed=101, paper_avg_len=18.67),
        DatasetSpec("D2", "product", 1076, 1076, 3, 3, 1076, desc_words=21,
                    pool_frac=0.35,
                    noise1=NoiseProfile(typo=0.02, paraphrase=0.30),
                    noise2=NoiseProfile(typo=0.04, drop_tok=0.10,
                                        paraphrase=0.45),
                    seed=102, paper_avg_len=198.64),
        DatasetSpec("D3", "product", 1354, 3039, 4, 4, 1104, desc_words=95,
                    pool_frac=0.5,
                    noise1=NoiseProfile(typo=0.01, paraphrase=0.25),
                    noise2=NoiseProfile(typo=0.02, drop_tok=0.15,
                                        paraphrase=0.45),
                    seed=103, paper_avg_len=792.43),
        DatasetSpec("D4", "bib", 2616, 2294, 4, 4, 2224,
                    noise1=NoiseProfile(typo=0.01),
                    noise2=NoiseProfile(typo=0.03, abbrev=0.08),
                    seed=104, paper_avg_len=133.29),
        DatasetSpec("D5", "movie", 5118, 6056, 13, 30, 1968,
                    noise1=NoiseProfile(typo=0.02, missing=0.15),
                    noise2=NoiseProfile(typo=0.03, missing=0.20),
                    seed=105, paper_avg_len=81.49),
        DatasetSpec("D6", "movie", 5118, 7810, 13, 9, 1072,
                    noise1=NoiseProfile(typo=0.03, missing=0.20),
                    noise2=NoiseProfile(typo=0.05, missing=0.25, drop_tok=0.05),
                    seed=106, paper_avg_len=71.48),
        DatasetSpec("D7", "movie", 6056, 7810, 30, 9, 1095,
                    noise1=NoiseProfile(typo=0.02, missing=0.10),
                    noise2=NoiseProfile(typo=0.03, missing=0.15),
                    seed=107, paper_avg_len=104.16),
        DatasetSpec("D8", "product", 2554, 22074, 6, 6, 853, desc_words=5,
                    pool_frac=0.4,
                    noise1=NoiseProfile(typo=0.10, drop_tok=0.05,
                                        paraphrase=0.30),
                    noise2=NoiseProfile(typo=0.12, drop_tok=0.08,
                                        paraphrase=0.40),
                    seed=108, paper_avg_len=103.35),
        DatasetSpec("D9", "bib", 2516, 61353, 4, 4, 2308,
                    noise1=NoiseProfile(typo=0.01),
                    noise2=NoiseProfile(typo=0.08, abbrev=0.20, drop_tok=0.10),
                    seed=109, paper_avg_len=115.57),
        DatasetSpec("D10", "movie", 27615, 23182, 4, 7, 22863,
                    noise1=NoiseProfile(typo=0.10, missing=0.35, drop_tok=0.10),
                    noise2=NoiseProfile(typo=0.14, missing=0.45, drop_tok=0.15,
                                        misplace=0.15),
                    seed=110, paper_avg_len=54.04),
    ]
}


# ---------------------------------------------------------------------------
# Clean-object factories. Objects are plain dicts of canonical fields; the
# per-source renderer maps fields to positional attributes.
# ---------------------------------------------------------------------------


def _pick(g: np.random.Generator, lst: list[str]) -> str:
    return lst[int(g.integers(0, len(lst)))]


def _pool(lst: list[str], frac: float, lo: int = 4) -> list[str]:
    """Truncated vocabulary pool: smaller pools ⇒ more confusable entities."""
    return lst[: max(lo, int(len(lst) * frac))]


def _person(g: np.random.Generator) -> str:
    return f"{_pick(g, V.FIRST_NAMES)} {_pick(g, V.LAST_NAMES)}"


def _make_restaurant(g: np.random.Generator) -> dict:
    return {
        "name": f"{_pick(g, V.LAST_NAMES)} {_pick(g, V.CUISINES)} "
                f"{_pick(g, ['cafe', 'grill', 'house', 'kitchen', 'bistro'])}",
        "address": f"{int(g.integers(1, 999))} {_pick(g, V.STREETS)} st",
        "city": _pick(g, V.CITIES),
        "phone": f"{int(g.integers(200, 999))}-{int(g.integers(100, 999))}-{int(g.integers(1000, 9999))}",
        "cuisine": _pick(g, V.CUISINES),
        "owner": _person(g),
        "rating": str(round(float(g.random() * 4 + 1), 1)),
    }


def _make_product(g: np.random.Generator, desc_words: int,
                  pool_frac: float = 1.0) -> dict:
    brand = _pick(g, _pool(V.BRANDS, pool_frac))
    noun = _pick(g, _pool(V.PRODUCT_NOUNS, pool_frac))
    model = f"{_pick(g, _pool(V.TERMINOLOGY, pool_frac, lo=40)[:300])}{int(g.integers(10, 999))}"
    name = f"{brand} {model} {_pick(g, _pool(V.PRODUCT_ADJS, pool_frac))} {noun}"
    pool = (_pool(V.PRODUCT_ADJS, pool_frac) + _pool(V.PRODUCT_NOUNS, pool_frac)
            + V.STOPWORDS + _pool(V.TERMINOLOGY, pool_frac, lo=40)[:300])
    desc = " ".join(_pick(g, pool) for _ in range(max(0, desc_words)))
    return {
        "name": name,
        "description": desc,
        "price": str(round(float(g.random() * 900 + 20), 2)),
        "manufacturer": brand,
        "category": noun,
        "upc": str(int(g.integers(10 ** 9, 10 ** 10))),
    }


def _make_bib(g: np.random.Generator) -> dict:
    nw = int(g.integers(8, 14))
    title_toks = []
    for j in range(nw):
        src = V.STOPWORDS if j % 3 == 2 else V.TITLE_WORDS
        title_toks.append(_pick(g, src))
    n_auth = int(g.integers(1, 5))
    return {
        "title": " ".join(title_toks),
        "authors": ", ".join(_person(g) for _ in range(n_auth)),
        "venue": _pick(g, V.VENUES),
        "year": str(int(g.integers(1995, 2021))),
    }


def _make_movie(g: np.random.Generator) -> dict:
    nt = int(g.integers(1, 5))
    title = " ".join(_pick(g, V.MOVIE_WORDS) for _ in range(nt))
    if g.random() < 0.4:
        title = "the " + title
    n_act = int(g.integers(2, 5))
    return {
        "title": title,
        "year": str(int(g.integers(1950, 2021))),
        "director": _person(g),
        "actors": ", ".join(_person(g) for _ in range(n_act)),
        "genre": _pick(g, V.GENRES),
        "language": _pick(g, ["english", "french", "spanish", "german", "italian"]),
        "runtime": str(int(g.integers(70, 200))),
    }


_FACTORIES = {
    "restaurant": lambda g, spec: _make_restaurant(g),
    "product": lambda g, spec: _make_product(g, spec.desc_words,
                                             getattr(spec, "pool_frac", 1.0)),
    "bib": lambda g, spec: _make_bib(g),
    "movie": lambda g, spec: _make_movie(g),
}

#: Long free-text fields two sources write independently — paraphrase noise
#: resamples tokens here (the match signal lives in names/titles).
_PARAPHRASE_FIELDS = {"description"}
#: Source-local identifiers/formatting: regenerated or jittered per render.
_VOLATILE_FIELDS = {"upc", "price", "rating"}

# Which canonical fields fill the first positional attributes, per domain.
_FIELD_ORDER = {
    "restaurant": ["name", "address", "city", "phone", "cuisine", "owner", "rating"],
    "product": ["name", "description", "price", "manufacturer", "category", "upc"],
    "bib": ["title", "authors", "venue", "year"],
    "movie": ["title", "year", "director", "actors", "genre", "language", "runtime"],
}


def _render(obj: dict, spec: DatasetSpec, n_attrs: int, noise: NoiseProfile,
            g: np.random.Generator, *, volatile: bool = True) -> list[str]:
    """Object → positional attribute values with noise applied.

    Attributes beyond the domain's field list are filler metadata (usually
    empty) so |A| matches the paper without inflating sentence length.
    """
    fields = _FIELD_ORDER[spec.domain]
    para_pool = (_pool(V.PRODUCT_ADJS, spec.pool_frac)
                 + _pool(V.PRODUCT_NOUNS, spec.pool_frac) + V.STOPWORDS)
    vals = []
    for i in range(n_attrs):
        if i < len(fields):
            fname = fields[i]
            v = obj[fname]
            if i > 0 and g.random() < noise.missing:  # never blank the name/title
                v = ""
            elif volatile and fname in _VOLATILE_FIELDS:
                # source-local value: numeric jitter / reformat (a shop's own
                # price & internal id never match the other shop's exactly)
                if fname == "upc":
                    v = str(int(g.integers(10 ** 9, 10 ** 10)))
                else:
                    try:
                        v = str(round(float(v) * (1 + 0.08 * (g.random() - 0.5)), 2))
                    except ValueError:
                        pass
            else:
                if noise.paraphrase > 0 and fname in _PARAPHRASE_FIELDS:
                    v = " ".join(
                        _pick(g, para_pool) if g.random() < noise.paraphrase else t
                        for t in v.split())
                if any((noise.typo, noise.drop_tok, noise.abbrev)):
                    v = V.corrupt_text(v, g, typo_rate=noise.typo,
                                       drop_rate=noise.drop_tok,
                                       abbrev_rate=noise.abbrev)
            vals.append(v)
        else:
            # sparse filler metadata attribute
            vals.append(_pick(g, V.TERMINOLOGY[:100]) if g.random() < 0.05 else "")
    if noise.misplace > 0 and len(vals) >= 2 and g.random() < noise.misplace:
        i, j = g.choice(len(fields) if len(fields) <= n_attrs else n_attrs,
                        size=2, replace=False)
        vals[i], vals[j] = vals[j], vals[i]
    return vals


def generate(spark: SparkSession, name: str) -> tuple[DataFrame, DataFrame, DataFrame]:
    """Build dataset ``name`` → (source1, source2, ground_truth).

    Sources have columns ``id, attr1..attrK``; ground truth has
    ``id1, id2`` (ids are disjoint across sources: source2 ids are offset).
    """
    p1, p2, gt = generate_pandas(name)
    return (
        spark.createDataFrame(p1),
        spark.createDataFrame(p2),
        spark.createDataFrame(gt),
    )


def generate_pandas(name: str) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """Pandas variant of :func:`generate` (used by tests and DSM builder)."""
    spec = DATASETS[name]
    g = np.random.default_rng(spec.seed)
    n_objects = spec.n1 + spec.n2 - spec.n_dups
    objects = [_FACTORIES[spec.domain](g, spec) for _ in range(n_objects)]

    # source 1: objects[0:n1]; source 2: dups first, then the remainder
    idx2 = list(range(spec.n_dups)) + list(range(spec.n1, n_objects))

    def build(indices: list[int], n_attrs: int, noise: NoiseProfile,
              id_offset: int, seed: int) -> pd.DataFrame:
        gg = np.random.default_rng(seed)
        rows = [_render(objects[ix], spec, n_attrs, noise, gg) for ix in indices]
        df = pd.DataFrame(rows, columns=[f"attr{i+1}" for i in range(n_attrs)])
        df.insert(0, "id", np.arange(len(indices)) + id_offset)
        return df

    p1 = build(list(range(spec.n1)), spec.attrs1, spec.noise1, 0, spec.seed + 1)
    p2 = build(idx2, spec.attrs2, spec.noise2, 1_000_000, spec.seed + 2)
    gt = pd.DataFrame({
        "id1": np.arange(spec.n_dups),
        "id2": np.arange(spec.n_dups) + 1_000_000,
    })
    return p1, p2, gt

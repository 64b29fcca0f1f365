"""Tokenization and schema-agnostic sentence construction.

The paper's vectorization is schema-agnostic: every entity becomes one
"sentence" by concatenating all of its textual attribute values. ``sentence``
builds that column with Spark SQL expressions (Catalyst-optimizable); the
word/char-n-gram tokenizers are plain-Python helpers used inside the numpy
embedding kernels and the ZeroER feature extractor.
"""
from __future__ import annotations

import re

from pyspark.sql import Column, DataFrame
import pyspark.sql.functions as F

_WORD_RE = re.compile(r"[a-z0-9]+")


def words(text: str) -> list[str]:
    """Lowercase word tokens (runs of [a-z0-9]); '' and None give []."""
    if not text:
        return []
    return _WORD_RE.findall(text.lower())


def char_ngrams(token: str, n_min: int = 3, n_max: int = 5) -> list[str]:
    """FastText-style char n-grams of ``<token>`` with boundary markers.

    Tokens shorter than ``n_min``-2 still yield the whole-word gram, so
    every token has at least one n-gram.
    """
    marked = f"<{token}>"
    grams = []
    for n in range(n_min, n_max + 1):
        if n > len(marked):
            break
        grams.extend(marked[i:i + n] for i in range(len(marked) - n + 1))
    return grams or [marked]


def sentence_expr(attr_cols: list[str]) -> Column:
    """Schema-agnostic "sentence": space-joined non-null attribute values."""
    return F.trim(F.concat_ws(" ", *[F.coalesce(F.col(c).cast("string"), F.lit("")) for c in attr_cols]))


def with_sentence(df: DataFrame, attr_cols: list[str] | None = None,
                  out_col: str = "sentence", id_col: str = "id") -> DataFrame:
    """Add the schema-agnostic sentence column.

    ``attr_cols`` defaults to every column except ``id_col`` and any
    already-present ``out_col`` — i.e. "all attribute values per entity".
    """
    if attr_cols is None:
        attr_cols = [c for c in df.columns if c not in (id_col, out_col)]
    return df.withColumn(out_col, sentence_expr(attr_cols))

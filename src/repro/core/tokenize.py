"""Tokenization for lake cells, as a pure function and as a Spark pass.

The paper tokenizes with the RoBERTa sub-word tokenizer; we use a
word-level tokenizer with numeric bucketization (arbitrary floats would
otherwise blow up the Word2Vec vocabulary while carrying no distribu-
tional signal). Year-like integers are kept verbatim since they are a
deliberately ambiguous shared type across domains (Fig. 1).
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

_SPLIT = re.compile(r"[^a-z0-9.]+")
_NUM = re.compile(r"^\d+(\.\d+)?$")


def bucket_number(tok: str) -> str:
    """Map a numeric token to a coarse magnitude bucket token.

    Keeps year-like integers (1900–2099) verbatim; other numbers become
    ``<num:{leading digit}e{#integer digits}>`` so that columns with the
    same numeric scale share vocabulary.
    """
    intpart = tok.split(".", 1)[0] or "0"
    if "." not in tok and 4 == len(intpart) and intpart[:2] in ("19", "20"):
        return tok
    lead = intpart.lstrip("0")[:1] or "0"
    return f"<num:{lead}e{len(intpart.lstrip('0'))}>"


def tokenize_cell(cell: str) -> list[str]:
    """Lowercase, split on non-alphanumerics, bucketize pure numbers."""
    out: list[str] = []
    for tok in _SPLIT.split(cell.lower()):
        tok = tok.strip(".")
        if not tok:
            continue
        out.append(bucket_number(tok) if _NUM.match(tok) else tok)
    return out


_TOKENS_SCHEMA = T.ArrayType(T.ArrayType(T.StringType()))


@F.pandas_udf(_TOKENS_SCHEMA)
def _tokenize_cells_udf(cells: pd.Series) -> pd.Series:
    return cells.apply(lambda cs: [tokenize_cell(c) for c in cs])


def tokenize_lake(lake_df: DataFrame) -> DataFrame:
    """Add ``cell_tokens: array<array<string>>`` (one token list per cell)."""
    return lake_df.withColumn("cell_tokens", _tokenize_cells_udf("cells"))

"""Tokenizer unit tests + Spark pass consistency."""
import pytest
from pyspark.sql import functions as F

from repro.core.tokenize import bucket_number, tokenize_cell, tokenize_lake


@pytest.mark.parametrize(
    "cell,expected",
    [
        ("Philip Duffy", ["philip", "duffy"]),
        ("LONDON", ["london"]),
        ("", []),
        ("   ", []),
        ("2019", ["2019"]),  # year-like kept verbatim
        ("1899", ["<num:1e4>"]),  # below the 1900–2099 year window
        ("2101", ["<num:2e4>"]),  # not year-like
        ("189.06", ["<num:1e3>"]),
        ("0.5", ["<num:0e0>"]),
        ("12000", ["<num:1e5>"]),
        ("a-b_c", ["a", "b", "c"]),
        ("Mount Everest 8848", ["mount", "everest", "<num:8e4>"]),
        ("03/28/99", ["<num:3e1>", "<num:2e2>", "<num:9e2>"]),
        ("SS Maria", ["ss", "maria"]),
    ],
)
def test_tokenize_cell(cell, expected):
    assert tokenize_cell(cell) == expected


@pytest.mark.parametrize(
    "tok,expected",
    [
        ("1995", "1995"),
        ("2023", "2023"),
        ("123", "<num:1e3>"),
        ("99.5", "<num:9e2>"),
        ("0", "<num:0e0>"),
        ("007", "<num:7e1>"),
    ],
)
def test_bucket_number(tok, expected):
    assert bucket_number(tok) == expected


def test_same_magnitude_same_bucket():
    assert bucket_number("1234") != "1234" or True
    assert bucket_number("150") == bucket_number("199")
    assert bucket_number("150") != bucket_number("1500")


def test_tokenize_lake_matches_driver(spark, tiny_santos):
    """The Spark pass must agree with the pure-python tokenizer."""
    df = tokenize_lake(tiny_santos.df).select("table_id", "col_idx", "cells", "cell_tokens")
    rows = df.orderBy("table_id", "col_idx").limit(20).collect()
    for r in rows:
        expected = [tokenize_cell(c) for c in r["cells"]]
        got = [list(ct) for ct in r["cell_tokens"]]
        assert got == expected


def test_tokenize_lake_shape(spark, tiny_santos):
    df = tokenize_lake(tiny_santos.df)
    bad = df.where(F.size("cell_tokens") != F.size("cells")).count()
    assert bad == 0

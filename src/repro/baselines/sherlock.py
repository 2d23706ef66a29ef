"""Sherlock-like baseline (paper §5.1.4, Hulsebos et al. [21]).

Sherlock learns column vectors from engineered features (statistics,
character distributions, word embeddings). Without its labeled semantic
-type training set (not reproducible offline, and the paper uses it as a
*representation*, not a classifier), we use the same feature groups
directly as the column vector — a single-column, context-free encoder.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from ..core.encoder import Embedder
from .featurize import feature_embeddings


def sherlock_embeddings(tokens_df: DataFrame, embedder: Embedder) -> DataFrame:
    return feature_embeddings(tokens_df, embedder, "sherlock")

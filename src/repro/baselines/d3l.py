"""D3L-like baseline (paper §5.1.4, Bogatu et al. [2]).

D3L ensembles per-feature distances: value overlap, formatting (regular
expressions), word embeddings, and distribution features (the column-
name feature is omitted, as the paper does for fairness). Each feature
is an L2-normalized block, so the cosine of the concatenated vector is
the ensemble average of per-feature cosines.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from ..core.encoder import Embedder
from .featurize import feature_embeddings


def d3l_embeddings(tokens_df: DataFrame, embedder: Embedder) -> DataFrame:
    return feature_embeddings(tokens_df, embedder, "d3l")

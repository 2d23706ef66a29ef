"""SATO-like baseline (paper §5.1.4, Zhang et al. [54]).

SATO extends Sherlock with *table context* captured by an LDA topic
model over the table's values. Our stand-in for the topic vector is the
table-level mean of the per-column embedding blocks — a fixed (untrained)
context signal, which is exactly the qualitative difference the paper
exploits: SATO has context but no contrastive training, so it lands
between Sherlock and Starmie.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from ..core.encoder import Embedder
from .featurize import feature_embeddings


def sato_embeddings(tokens_df: DataFrame, embedder: Embedder) -> DataFrame:
    return feature_embeddings(tokens_df, embedder, "sato")

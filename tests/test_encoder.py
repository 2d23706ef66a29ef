"""Column encoders: Word2Vec pretraining, contrastive training, Spark inference."""
import numpy as np
import pytest

from repro.core.augment import TableView
from repro.core.encoder import (
    MultiColumnEncoder,
    SingleColEncoder,
    base_vectors,
    collect_table_views,
    context_vectors,
    infer_embeddings,
)


@pytest.fixture(scope="module")
def views(prep_santos):
    return collect_table_views(prep_santos.prep_df, prep_santos.embedder)


def test_word2vec_vocabulary(prep_santos):
    emb = prep_santos.embedder
    assert emb.dim == 64
    assert len(emb.vectors) > 100
    v = next(iter(emb.vectors.values()))
    assert v.shape == (64,)


def test_word2vec_same_type_tokens_closer(prep_santos):
    """Tokens from one vocabulary pool should be closer than cross-pool."""
    from repro.datalake.vocab import TYPES

    emb = prep_santos.embedder

    def tok(pool_name, i):
        from repro.core.tokenize import tokenize_cell

        for v in TYPES[pool_name].pool[i:]:
            ts = tokenize_cell(v)
            if ts and ts[0] in emb.vectors:
                return emb.vectors[ts[0]] / np.linalg.norm(emb.vectors[ts[0]])
        return None

    cities = [tok("city", i) for i in (0, 3, 6, 9)]
    species = [tok("species_common", i) for i in (0, 3, 6, 9)]
    cities = [c for c in cities if c is not None]
    species = [s for s in species if s is not None]
    if len(cities) >= 2 and len(species) >= 2:
        within = np.mean([c1 @ c2 for c1 in cities for c2 in cities])
        cross = np.mean([c @ s for c in cities for s in species])
        assert within > cross


def test_collect_table_views_complete(views, tiny_santos):
    assert set(views) == set(tiny_santos.tables())
    for v in views.values():
        assert all(c.vecs.shape[1] == 64 for c in v.cols)
        assert [c.col_id for c in v.cols] == list(range(len(v.cols)))


def test_base_vectors_mean_of_units(views):
    v = next(iter(views.values()))
    b = base_vectors(v, 64)
    for i, c in enumerate(v.cols):
        if len(c.vecs):
            assert np.allclose(b[i], c.vecs.mean(axis=0), atol=1e-6)


def test_context_vectors_excludes_self():
    b = np.array([[1.0, 0.0], [0.0, 1.0], [1.0, 1.0]])
    c = context_vectors(b)
    assert np.allclose(c[0], [0.5, 1.0])
    assert np.allclose(c[1], [1.0, 0.5])


def test_context_vector_single_column():
    assert not context_vectors(np.ones((1, 4))).any()


def test_training_reduces_loss(views, prep_santos):
    enc = MultiColumnEncoder(d_in=64, seed=0)
    stats = enc.train(views, op="drop_col", n_epochs=6, embedder=prep_santos.embedder, seed=0)
    first = np.mean(stats.losses[: len(stats.losses) // 5])
    last = np.mean(stats.losses[-len(stats.losses) // 5 :])
    assert last < first


def test_singlecol_training_reduces_loss(views, prep_santos):
    enc = SingleColEncoder(d_in=64, seed=0)
    stats = enc.train(views, op="drop_cell", n_epochs=4, embedder=prep_santos.embedder, seed=0)
    assert np.mean(stats.losses[-5:]) < np.mean(stats.losses[:5])


def test_encode_view_unit_norm(views):
    enc = MultiColumnEncoder(d_in=64, seed=0)
    z = enc.encode_view(next(iter(views.values())))
    norms = np.linalg.norm(z, axis=1)
    assert np.allclose(norms[norms > 0], 1.0, atol=1e-5)


def test_singlecol_ignores_context(views):
    enc = SingleColEncoder(d_in=64, seed=0)
    view = next(v for v in views.values() if len(v.cols) >= 3)
    z_full = enc.encode_view(view)
    # dropping a column must not change the remaining columns' embeddings
    sub = TableView(view.table_id, view.cols[:-1])
    z_sub = enc.encode_view(sub)
    assert np.allclose(z_full[: len(sub.cols)], z_sub, atol=1e-6)


def test_multicolumn_uses_context(views, prep_santos):
    enc = MultiColumnEncoder(d_in=64, seed=0)
    enc.train(views, op="drop_col", n_epochs=4, embedder=prep_santos.embedder, seed=0)
    view = next(v for v in views.values() if len(v.cols) >= 3)
    z_full = enc.encode_view(view)
    sub = TableView(view.table_id, view.cols[:-1])
    z_sub = enc.encode_view(sub)
    # contextual path: removing a column shifts the others' embeddings
    assert not np.allclose(z_full[: len(sub.cols)], z_sub, atol=1e-6)


def test_infer_matches_driver_encoding(prep_santos, views):
    """Spark inference must agree with driver-side encode_view."""
    enc = MultiColumnEncoder(d_in=64, seed=3)
    emb_df = infer_embeddings(prep_santos.prep_df, prep_santos.embedder, enc)
    rows = emb_df.collect()
    by_table: dict[str, dict[int, np.ndarray]] = {}
    for r in rows:
        by_table.setdefault(r["table_id"], {})[r["col_idx"]] = np.asarray(r["emb"])
    for tid, view in list(views.items())[:10]:
        z = enc.encode_view(view)
        for i, c in enumerate(view.cols):
            got = by_table[tid][c.col_id]
            assert np.allclose(got, z[i], atol=1e-4), tid


def test_infer_schema_carries_ground_truth(prep_santos):
    enc = SingleColEncoder(d_in=64, seed=0)
    emb_df = infer_embeddings(prep_santos.prep_df, prep_santos.embedder, enc)
    assert {"table_id", "col_idx", "sem_type", "domain", "emb"} <= set(emb_df.columns)
    assert emb_df.count() == prep_santos.prep_df.count()


def test_trained_encoder_separates_ambiguous_columns(prep_santos, views):
    """The core claim (Fig. 1): context separates same-vocab columns from
    different domains; training must not collapse them together."""
    enc = MultiColumnEncoder(d_in=64, seed=0)
    enc.train(views, op="drop_col", n_epochs=8, embedder=prep_santos.embedder, seed=0)
    emb_df = infer_embeddings(prep_santos.prep_df, prep_santos.embedder, enc)
    rows = emb_df.where("sem_type = 'year'").collect()
    by_dom: dict[str, list[np.ndarray]] = {}
    for r in rows:
        by_dom.setdefault(r["domain"], []).append(np.asarray(r["emb"]))
    doms = [d for d, v in by_dom.items() if len(v) >= 2][:2]
    if len(doms) == 2:
        a = np.stack(by_dom[doms[0]])
        b = np.stack(by_dom[doms[1]])
        within = (np.mean(a @ a.T) + np.mean(b @ b.T)) / 2
        cross = np.mean(a @ b.T)
        assert within > cross

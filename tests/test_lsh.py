"""simHash LSH index: collision behaviour, recall, memory accounting."""
import numpy as np
import pytest

from repro.search.lsh import SimHashLSH


def unit(v):
    return v / np.linalg.norm(v, axis=-1, keepdims=True)


@pytest.fixture(scope="module")
def clustered():
    """3 tight clusters of unit vectors."""
    g = np.random.default_rng(0)
    centers = unit(g.normal(size=(3, 32)))
    vecs, labels = [], []
    for ci, c in enumerate(centers):
        for _ in range(40):
            v = unit(c + 0.15 * g.normal(size=32))
            vecs.append(v)
            labels.append(ci)
    return np.asarray(vecs, dtype=np.float32), np.asarray(labels)


def test_same_vector_always_retrieved(clustered):
    vecs, _ = clustered
    idx = SimHashLSH(32, seed=1)
    idx.add(np.arange(len(vecs)), vecs)
    for i in (0, 17, 100):
        assert i in idx.query(vecs[i])


def test_cluster_members_dominate_candidates(clustered):
    vecs, labels = clustered
    idx = SimHashLSH(32, n_tables=8, n_bits=10, seed=2)
    idx.add(np.arange(len(vecs)), vecs)
    hits = 0
    total = 0
    for i in range(0, len(vecs), 7):
        cands = idx.query(vecs[i])
        if len(cands) > 1:
            same = sum(1 for c in cands if labels[c] == labels[i])
            hits += same
            total += len(cands)
    assert total > 0
    assert hits / total > 0.8


def test_more_bits_fewer_candidates(clustered):
    vecs, _ = clustered
    coarse = SimHashLSH(32, n_tables=4, n_bits=4, seed=3)
    fine = SimHashLSH(32, n_tables=4, n_bits=16, seed=3)
    ids = np.arange(len(vecs))
    coarse.add(ids, vecs)
    fine.add(ids, vecs)
    n_coarse = np.mean([len(coarse.query(vecs[i])) for i in range(20)])
    n_fine = np.mean([len(fine.query(vecs[i])) for i in range(20)])
    assert n_fine <= n_coarse


def test_deterministic_given_seed(clustered):
    vecs, _ = clustered
    a = SimHashLSH(32, seed=5)
    b = SimHashLSH(32, seed=5)
    ids = np.arange(len(vecs))
    a.add(ids, vecs)
    b.add(ids, vecs)
    for i in range(10):
        assert sorted(a.query(vecs[i])) == sorted(b.query(vecs[i]))


def test_memory_bytes_grows(clustered):
    vecs, _ = clustered
    idx = SimHashLSH(32, seed=0)
    base = idx.memory_bytes()
    idx.add(np.arange(len(vecs)), vecs)
    assert idx.memory_bytes() > base
    assert idx.n_items == len(vecs)


def test_empty_query():
    idx = SimHashLSH(16, seed=0)
    assert idx.query(np.ones(16, dtype=np.float32)) == []

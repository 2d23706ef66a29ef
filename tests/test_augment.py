"""Augmentation operators (Table 1): invariants + alignment bookkeeping (Fig. 5)."""
import numpy as np
import pytest

from repro.core.augment import OPS, ColumnView, TableView, aligned_pairs, apply_op


def make_view(n_cols=4, n_units=8, d=6, seed=0, numeric_flags=None, empty=None):
    g = np.random.default_rng(seed)
    cols = []
    for i in range(n_cols):
        units = [[f"c{i}u{j}", f"c{i}x{j}"] for j in range(n_units)]
        cols.append(
            ColumnView(
                col_id=i,
                units=units,
                vecs=g.normal(size=(n_units, d)).astype(np.float32),
                is_numeric=(numeric_flags or [False] * n_cols)[i],
                empty_frac=(empty or [0.0] * n_cols)[i],
            )
        )
    return TableView("t", cols)


@pytest.mark.parametrize("op", OPS)
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_op_basic_invariants(op, seed):
    view = make_view(numeric_flags=[False, True, False, True], empty=[0, 0, 0.5, 0])
    rng = np.random.default_rng(seed)
    out = apply_op(view, op, rng)
    assert 1 <= len(out.cols) <= len(view.cols)
    ids = [c.col_id for c in out.cols]
    assert len(set(ids)) == len(ids)
    assert set(ids) <= {c.col_id for c in view.cols}
    for c in out.cols:
        assert c.vecs.shape[0] == len(c.units)


@pytest.mark.parametrize("op", OPS)
def test_op_does_not_mutate_input(op):
    view = make_view(numeric_flags=[False, True, False, True], empty=[0, 0, 0.5, 0])
    before = [(c.col_id, [list(u) for u in c.units], c.vecs.copy()) for c in view.cols]
    apply_op(view, op, np.random.default_rng(7))
    for (cid, units, vecs), c in zip(before, view.cols):
        assert c.col_id == cid
        assert [list(u) for u in c.units] == units
        assert np.array_equal(c.vecs, vecs)


def test_drop_col_keeps_at_least_one():
    view = make_view(n_cols=2)
    for seed in range(10):
        out = apply_op(view, "drop_col", np.random.default_rng(seed))
        assert len(out.cols) >= 1


def test_drop_num_col_only_drops_numeric():
    view = make_view(numeric_flags=[True, False, True, False])
    for seed in range(10):
        out = apply_op(view, "drop_num_col", np.random.default_rng(seed))
        kept = {c.col_id for c in out.cols}
        assert {1, 3} <= kept  # non-numeric always survive


def test_drop_nan_col_prefers_empty_columns():
    view = make_view(empty=[0.0, 0.9, 0.0, 0.0])
    dropped_counts = {i: 0 for i in range(4)}
    for seed in range(20):
        out = apply_op(view, "drop_nan_col", np.random.default_rng(seed))
        for i in range(4):
            if i not in {c.col_id for c in out.cols}:
                dropped_counts[i] += 1
    assert dropped_counts[1] == 20  # the nan-heavy column is always droppable
    assert dropped_counts[0] == dropped_counts[2] == 0


def test_shuffle_col_permutes_only():
    view = make_view()
    out = apply_op(view, "shuffle_col", np.random.default_rng(3))
    assert sorted(c.col_id for c in out.cols) == [0, 1, 2, 3]


def test_sample_row_halves_units():
    view = make_view(n_units=10)
    out = apply_op(view, "sample_row", np.random.default_rng(0))
    for c in out.cols:
        assert len(c.units) == 5


def test_sample_row_ordered_preserves_order():
    view = make_view(n_units=10)
    out = apply_op(view, "sample_row_ordered", np.random.default_rng(0))
    for orig, c in zip(view.cols, out.cols):
        idx = [orig.units.index(u) for u in c.units]
        assert idx == sorted(idx)


def test_shuffle_row_keeps_all_units():
    view = make_view(n_units=6)
    out = apply_op(view, "shuffle_row", np.random.default_rng(1))
    for orig, c in zip(view.cols, out.cols):
        assert sorted(map(tuple, c.units)) == sorted(map(tuple, orig.units))


def test_drop_token_shrinks_a_unit():
    view = make_view()
    changed = False
    for seed in range(10):
        out = apply_op(view, "drop_token", np.random.default_rng(seed))
        for orig, c in zip(view.cols, out.cols):
            if any(len(u) < 2 for u in c.units):
                changed = True
    assert changed


def test_aligned_pairs_full_overlap():
    view = make_view()
    pairs = aligned_pairs(view, view, 0, 4)
    assert pairs == [(0, 4), (1, 5), (2, 6), (3, 7)]


def test_aligned_pairs_after_drop():
    view = make_view()
    aug = TableView("t", [view.cols[0], view.cols[2]])
    pairs = aligned_pairs(view, aug, 0, 4)
    assert pairs == [(0, 4), (2, 5)]


def test_aligned_pairs_after_shuffle():
    view = make_view(n_cols=3)
    aug = TableView("t", [view.cols[2], view.cols[0], view.cols[1]])
    pairs = aligned_pairs(view, aug, 0, 3)
    assert pairs == [(0, 4), (1, 5), (2, 3)]


def test_unknown_op_raises():
    with pytest.raises(ValueError):
        apply_op(make_view(), "nope", np.random.default_rng(0))

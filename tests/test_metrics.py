"""MAP/P/R@k, IDEAL recall, purity — hand-computed cases."""
import pytest

from repro.eval.metrics import (
    average_precision_at_k,
    evaluate_rankings,
    ideal_recall,
    precision_at_k,
    purity,
    recall_at_k,
)


def test_ap_perfect_ranking():
    assert average_precision_at_k(["a", "b", "c"], {"a", "b", "c"}, 3) == 1.0


def test_ap_worst_ranking():
    assert average_precision_at_k(["x", "y", "z"], {"a"}, 3) == 0.0


def test_ap_partial():
    # hits at ranks 1 and 3: (1/1 + 2/3) / 2
    ap = average_precision_at_k(["a", "x", "b"], {"a", "b"}, 3)
    assert ap == pytest.approx((1 + 2 / 3) / 2)


def test_ap_normalizes_by_min_k_rel():
    # 5 relevant but k=2: normalizer is 2
    ap = average_precision_at_k(["a", "b"], {"a", "b", "c", "d", "e"}, 2)
    assert ap == 1.0


def test_ap_empty_relevant():
    assert average_precision_at_k(["a"], set(), 5) == 0.0


def test_precision_at_k():
    assert precision_at_k(["a", "x", "b", "y"], {"a", "b"}, 4) == 0.5
    assert precision_at_k(["a"], {"a"}, 10) == pytest.approx(0.1)


def test_recall_at_k():
    assert recall_at_k(["a", "x"], {"a", "b", "c"}, 2) == pytest.approx(1 / 3)
    assert recall_at_k([], {"a"}, 5) == 0.0


def test_ideal_recall_k_smaller_than_gt():
    gt = {"q1": {"a", "b", "c", "d"}, "q2": {"a", "b"}}
    # q1: 2/4, q2: 2/2
    assert ideal_recall(gt, 2) == pytest.approx((0.5 + 1.0) / 2)


def test_ideal_recall_caps_at_one():
    assert ideal_recall({"q": {"a"}}, 10) == 1.0


def test_evaluate_rankings_aggregates():
    rankings = {"q1": ["a", "x"], "q2": ["b", "y"]}
    gt = {"q1": {"a"}, "q2": {"y", "b"}}
    ev = evaluate_rankings(rankings, gt, 2)
    assert ev["map"] == pytest.approx((1.0 + 1.0) / 2)
    assert ev["p"] == pytest.approx((0.5 + 1.0) / 2)
    assert ev["r"] == pytest.approx((1.0 + 1.0) / 2)


def test_evaluate_rankings_empty():
    assert evaluate_rankings({}, {}, 5) == {"map": 0.0, "p": 0.0, "r": 0.0}


def test_purity_perfect():
    assign = {"a": 0, "b": 0, "c": 1}
    labels = {"a": "x", "b": "x", "c": "y"}
    assert purity(assign, labels) == 1.0


def test_purity_mixed():
    assign = {"a": 0, "b": 0, "c": 0, "d": 1}
    labels = {"a": "x", "b": "x", "c": "y", "d": "z"}
    # cluster 0 majority x (2/3), cluster 1 pure → (2+1)/4
    assert purity(assign, labels) == pytest.approx(0.75)


def test_purity_empty():
    assert purity({}, {}) == 0.0

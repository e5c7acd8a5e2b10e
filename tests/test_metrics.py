"""Metrics vs brute force."""
import numpy as np
import pytest

from repro.tasks.metrics import auc_score, micro_macro_f1, precision_at_k


def _auc_brute(labels, scores):
    pos = scores[labels == 1]
    neg = scores[labels == 0]
    wins = sum((p > n) + 0.5 * (p == n) for p in pos for n in neg)
    return wins / (len(pos) * len(neg))


@pytest.mark.parametrize("seed", range(5))
def test_auc_matches_brute_force(seed):
    rng = np.random.default_rng(seed)
    labels = rng.integers(0, 2, 60)
    labels[0], labels[1] = 0, 1  # both classes present
    scores = np.round(rng.random(60), 2)  # ties likely
    assert auc_score(labels, scores) == pytest.approx(
        _auc_brute(labels, scores)
    )


def test_auc_perfect_and_inverted():
    labels = np.array([0, 0, 1, 1])
    assert auc_score(labels, np.array([0.1, 0.2, 0.8, 0.9])) == 1.0
    assert auc_score(labels, np.array([0.9, 0.8, 0.2, 0.1])) == 0.0
    assert auc_score(labels, np.array([0.5, 0.5, 0.5, 0.5])) == 0.5


def test_auc_requires_both_classes():
    with pytest.raises(ValueError):
        auc_score(np.ones(4), np.zeros(4))


def test_precision_at_k():
    ranked = np.array([1, 1, 0, 1, 0, 0], dtype=bool)
    got = precision_at_k(ranked, [1, 2, 3, 4, 6, 10])
    assert got[1] == 1.0 and got[2] == 1.0
    assert got[3] == pytest.approx(2 / 3)
    assert got[4] == pytest.approx(3 / 4)
    assert got[6] == pytest.approx(3 / 6)
    assert got[10] == pytest.approx(3 / 6)  # clipped to available


def test_micro_macro_f1_hand_case():
    y_true = np.array([0, 0, 1, 1, 2, 2])
    y_pred = np.array([0, 1, 1, 1, 2, 0])
    micro, macro = micro_macro_f1(y_true, y_pred)
    # micro-F1 == accuracy for single-label: 4/6
    assert micro == pytest.approx(4 / 6)
    # per class: c0 tp1 fp1 fn1 -> 0.5; c1 tp2 fp1 fn0 -> 0.8; c2 tp1 fp0 fn1 -> 2/3
    assert macro == pytest.approx((0.5 + 0.8 + 2 / 3) / 3)


def test_micro_macro_perfect():
    y = np.array([0, 1, 2, 1])
    assert micro_macro_f1(y, y) == (1.0, 1.0)

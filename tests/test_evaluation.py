"""Metric functions behind Table II."""
import numpy as np
import pytest

from repro.core.evaluation import accuracy, micro_f1, score


def test_accuracy_basic():
    assert accuracy([1, 2, 3], [1, 2, 4]) == pytest.approx(2 / 3)


def test_accuracy_perfect_and_zero():
    assert accuracy([1, 1], [1, 1]) == 1.0
    assert accuracy([0, 0], [1, 1]) == 0.0


def test_micro_f1_perfect():
    y = np.array([[1, 0], [0, 1]])
    assert micro_f1(y, y) == 1.0


def test_micro_f1_known_value():
    pred = np.array([[1, 1], [0, 0]])
    truth = np.array([[1, 0], [1, 0]])
    # tp=1, fp=1, fn=1 -> f1 = 2/(2+1+1)
    assert micro_f1(pred, truth) == pytest.approx(0.5)


def test_micro_f1_all_negative_is_one():
    z = np.zeros((3, 4))
    assert micro_f1(z, z) == 1.0


def test_score_dispatch():
    assert score("multiclass", [1], [1]) == 1.0
    assert score("multilabel", np.array([[1]]), np.array([[1]])) == 1.0

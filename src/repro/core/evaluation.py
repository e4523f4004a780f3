"""Prediction-quality metrics used in Table II.

The paper reports micro-F1 on PPI (multilabel) and accuracy on
OGB-Products / MAG240M (multiclass); we do the same on the lite
datasets.
"""
from __future__ import annotations

import numpy as np


def accuracy(pred: np.ndarray, truth: np.ndarray) -> float:
    """Fraction of exactly correct predictions (multiclass)."""
    pred, truth = np.asarray(pred), np.asarray(truth)
    return float((pred == truth).mean())


def micro_f1(pred: np.ndarray, truth: np.ndarray) -> float:
    """Micro-averaged F1 over all (node, class) cells (multilabel)."""
    pred = np.asarray(pred).astype(bool)
    truth = np.asarray(truth).astype(bool)
    tp = (pred & truth).sum()
    fp = (pred & ~truth).sum()
    fn = (~pred & truth).sum()
    denom = 2 * tp + fp + fn
    return float(2 * tp / denom) if denom else 1.0


def score(task: str, pred: np.ndarray, truth: np.ndarray) -> float:
    """Task-appropriate metric (micro-F1 for multilabel, else accuracy)."""
    return micro_f1(pred, truth) if task == "multilabel" else accuracy(pred, truth)

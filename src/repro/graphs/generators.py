"""Deterministic synthetic graph generators.

Graphs are returned as two Spark DataFrames:

* ``nodes``: ``id: long, feat: array<double>`` (+ optional label columns)
* ``edges``: ``src: long, dst: long`` — directed, no self-loops, deduped

``power_law_graph`` controls which side of the edge follows a power-law
(Zipf) degree distribution, mirroring the paper's variable-controlled
Power-Law datasets used for the partial-gather (in-skew) and
broadcast/shadow-nodes (out-skew) experiments.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def _features(n: int, dim: int, rng: np.random.Generator) -> list[list[float]]:
    return np.round(rng.standard_normal((n, dim)), 4).tolist()


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** alpha
    return w / w.sum()


def _edges_pdf(
    n_nodes: int,
    n_edges: int,
    *,
    skew: str,
    alpha: float,
    rng: np.random.Generator,
) -> pd.DataFrame:
    """Sample directed edges with the requested skew, then dedupe.

    ``skew``: which endpoint is Zipf-distributed — ``"in"`` (dst),
    ``"out"`` (src), ``"both"``, or ``"none"`` (uniform). Node ids are
    shuffled so hubs are not clustered at small ids.
    """
    if skew not in ("in", "out", "both", "none"):
        raise ValueError(f"unknown skew: {skew!r}")
    w = _zipf_weights(n_nodes, alpha)
    perm = rng.permutation(n_nodes)

    def endpoint(skewed: bool, size: int) -> np.ndarray:
        if skewed:
            return perm[rng.choice(n_nodes, size=size, p=w)]
        return rng.integers(0, n_nodes, size)

    # sample in rounds until the target count survives self-loop/dup
    # removal — heavy skew can lose >40% of a single batch to collisions
    batches: list[pd.DataFrame] = []
    have = 0
    for _ in range(12):
        m = int((n_edges - have) * 1.3) + 8
        src = endpoint(skew in ("out", "both"), m)
        dst = endpoint(skew in ("in", "both"), m)
        batches.append(pd.DataFrame({"src": src, "dst": dst}))
        pdf = pd.concat(batches, ignore_index=True)
        pdf = pdf[pdf.src != pdf.dst].drop_duplicates()
        have = len(pdf)
        if have >= n_edges:
            break
    return pdf.head(n_edges).reset_index(drop=True).astype("int64")


def power_law_graph(
    spark: SparkSession,
    *,
    n_nodes: int,
    avg_degree: float,
    skew: str = "both",
    alpha: float = 1.05,
    feat_dim: int = 16,
    seed: int = 0,
) -> tuple[DataFrame, DataFrame]:
    """Directed graph whose degree distribution follows a power law.

    Returns ``(nodes, edges)``. Deterministic in ``seed``.
    """
    rng = np.random.default_rng(seed)
    edges = _edges_pdf(n_nodes, int(n_nodes * avg_degree), skew=skew, alpha=alpha, rng=rng)
    nodes = pd.DataFrame(
        {"id": np.arange(n_nodes, dtype="int64"), "feat": _features(n_nodes, feat_dim, rng)}
    )
    return spark.createDataFrame(nodes), spark.createDataFrame(edges)


def uniform_graph(
    spark: SparkSession,
    *,
    n_nodes: int,
    avg_degree: float,
    feat_dim: int = 16,
    seed: int = 0,
) -> tuple[DataFrame, DataFrame]:
    """Erdős–Rényi-style directed graph (both endpoints uniform)."""
    return power_law_graph(
        spark,
        n_nodes=n_nodes,
        avg_degree=avg_degree,
        skew="none",
        feat_dim=feat_dim,
        seed=seed,
    )


def planted_labels(
    feat: np.ndarray,
    src: np.ndarray,
    dst: np.ndarray,
    *,
    n_classes: int,
    multilabel: bool = False,
    noise: float = 0.1,
    seed: int = 0,
) -> np.ndarray:
    """Labels from a random 2-layer teacher GNN so they depend on structure.

    Teacher: ``h1 = relu(X·W0 + mean_in(X)·W1)``, ``logits = h1·W2 +
    mean_in(h1)·W3 + ε``. Multiclass → argmax; multilabel → per-class
    threshold at the median (balanced positives).
    """
    rng = np.random.default_rng(seed)
    n, d = feat.shape

    def mean_in(x: np.ndarray) -> np.ndarray:
        s = np.zeros((n, x.shape[1]))
        np.add.at(s, dst, x[src])
        c = np.maximum(np.bincount(dst, minlength=n), 1.0)
        return s / c[:, None]

    hid = max(8, n_classes)
    w0, w1 = rng.standard_normal((d, hid)), rng.standard_normal((d, hid))
    w2, w3 = rng.standard_normal((hid, n_classes)), rng.standard_normal((hid, n_classes))
    h1 = np.maximum(feat @ w0 + mean_in(feat) @ w1, 0.0)
    logits = h1 @ w2 + mean_in(h1) @ w3 + noise * rng.standard_normal((n, n_classes))
    if multilabel:
        return (logits > np.median(logits, axis=0, keepdims=True)).astype("int64")
    return logits.argmax(axis=1).astype("int64")

"""Synthetic stand-ins for the paper's datasets (Table I).

The paper uses PPI, OGB-Products, MAG240M and a huge Power-Law graph —
all unavailable offline (and the latter three far beyond laptop scale).
Each ``*_lite`` dataset matches the original's *shape*: average degree,
task type (PPI: multilabel; Products/MAG: multiclass), and a train/val/
test split with a small labeled fraction. Labels are planted by a random
2-layer teacher GNN (``planted_labels``) so they genuinely depend on
graph structure — a model that ignores edges cannot fit them.

Scale-down factors are recorded in DESIGN.md §2/§6 and EXPERIMENTS.md.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.graphs.generators import _edges_pdf, _features, planted_labels


@dataclass(frozen=True)
class DatasetMeta:
    """Static description of a dataset (the row it gets in Table I)."""

    name: str
    n_nodes: int
    avg_degree: float
    feat_dim: int
    n_classes: int
    multilabel: bool
    paper_nodes: float
    paper_edges: float
    paper_feat: int
    paper_classes: int


PPI_LITE = DatasetMeta("ppi_lite", 1500, 14.4, 32, 16, True, 56944, 818716, 50, 121)
PRODUCTS_LITE = DatasetMeta(
    "products_lite", 4000, 25.3, 32, 12, False, 2_449_029, 61_859_140, 100, 47
)
MAG_LITE = DatasetMeta("mag_lite", 6000, 21.7, 48, 16, False, 1.2e8, 2.6e9, 768, 153)

ALL_METAS = {m.name: m for m in (PPI_LITE, PRODUCTS_LITE, MAG_LITE)}


def _splits(n: int, rng: np.random.Generator) -> np.ndarray:
    """10% train / 10% val / 80% test — a small labeled fraction, as in
    industrial graphs where inference covers the entire graph."""
    s = np.full(n, "test", dtype=object)
    idx = rng.permutation(n)
    s[idx[: n // 10]] = "train"
    s[idx[n // 10 : n // 5]] = "val"
    return s


def load(
    spark: SparkSession, name: str, *, scale: float = 1.0, seed: int = 7
) -> tuple[DataFrame, DataFrame, DatasetMeta]:
    """Build a lite dataset. ``scale`` multiplies the node count (tests
    use scale<1 for speed). Returns ``(nodes, edges, meta)``; the nodes
    frame carries ``feat``, ``label``/``labels`` and ``split`` columns.
    """
    meta = ALL_METAS[name]
    rng = np.random.default_rng(seed + hash(name) % 1000)
    n = max(200, int(meta.n_nodes * scale))
    epdf = _edges_pdf(
        n, int(n * meta.avg_degree), skew="both", alpha=1.02, rng=rng
    )
    feat = np.asarray(_features(n, meta.feat_dim, rng))
    y = planted_labels(
        feat,
        epdf["src"].to_numpy(),
        epdf["dst"].to_numpy(),
        n_classes=meta.n_classes,
        multilabel=meta.multilabel,
        seed=seed,
    )
    npdf = pd.DataFrame(
        {"id": np.arange(n, dtype="int64"), "feat": feat.tolist(), "split": _splits(n, rng)}
    )
    if meta.multilabel:
        npdf["labels"] = y.tolist()
    else:
        npdf["label"] = y
    return spark.createDataFrame(npdf), spark.createDataFrame(epdf), meta

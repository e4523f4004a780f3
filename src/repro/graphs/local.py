"""Local (driver-side) view of a graph for training and reference math.

``LocalGraph`` holds NumPy arrays plus an in-neighbor CSR index. It is
built either directly from arrays (tests, generators) or by collecting
small Spark DataFrames (``from_spark``). Training (mini-batch k-hop
sampling) and the dense reference forward both run on this view — the
paper likewise trains locally per worker on collected k-hop subgraphs.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame


@dataclass
class LocalGraph:
    """Directed graph with node features, as NumPy arrays.

    ``src``/``dst`` are aligned edge arrays (message flows src → dst, so
    a node's receptive field is its *in*-neighborhood).
    """

    feat: np.ndarray  # [n, d]
    src: np.ndarray  # [e]
    dst: np.ndarray  # [e]
    labels: np.ndarray | None = None  # [n] int or [n, L] multilabel
    split: np.ndarray | None = None  # [n] of {"train","val","test"}
    _in_ptr: np.ndarray = field(default=None, repr=False)
    _in_src: np.ndarray = field(default=None, repr=False)

    def __post_init__(self):
        self.feat = np.asarray(self.feat, dtype=np.float64)
        self.src = np.asarray(self.src, dtype=np.int64)
        self.dst = np.asarray(self.dst, dtype=np.int64)
        order = np.argsort(self.dst, kind="stable")
        self._in_src = self.src[order]
        counts = np.bincount(self.dst, minlength=self.n)
        self._in_ptr = np.concatenate([[0], np.cumsum(counts)])

    @property
    def n(self) -> int:
        return self.feat.shape[0]

    @property
    def e(self) -> int:
        return self.src.shape[0]

    @property
    def dim(self) -> int:
        return self.feat.shape[1]

    def in_neighbors(self, v: int) -> np.ndarray:
        """Source ids of v's in-edges."""
        return self._in_src[self._in_ptr[v] : self._in_ptr[v + 1]]

    def mask(self, name: str) -> np.ndarray:
        """Boolean node mask for a split name."""
        if self.split is None:
            raise ValueError("graph has no split column")
        return self.split == name

    # -- sampling --------------------------------------------------------
    def sample_khop(
        self, targets: np.ndarray, *, hops: int, fanout: int, rng: np.random.Generator
    ) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """Sampled k-hop in-neighborhood of ``targets`` (union, local ids).

        Returns ``(node_ids, sub_src, sub_dst)`` where sub arrays index
        into ``node_ids``. Used by mini-batch training; the distributed
        inference baseline has its own Spark implementation.
        """
        targets = np.asarray(targets, dtype=np.int64)
        keep_src, keep_dst = [], []
        frontier = np.unique(targets)
        visited = set(frontier.tolist())
        for _ in range(hops):
            nxt = []
            for v in frontier:
                nbrs = self.in_neighbors(v)
                if len(nbrs) > fanout:
                    nbrs = rng.choice(nbrs, size=fanout, replace=False)
                keep_src.append(nbrs)
                keep_dst.append(np.full(len(nbrs), v, dtype=np.int64))
                nxt.append(nbrs)
            frontier = np.unique(np.concatenate(nxt)) if nxt else np.array([], dtype=np.int64)
            frontier = np.array([v for v in frontier if v not in visited], dtype=np.int64)
            visited.update(frontier.tolist())
        s = np.concatenate(keep_src) if keep_src else np.array([], dtype=np.int64)
        d = np.concatenate(keep_dst) if keep_dst else np.array([], dtype=np.int64)
        node_ids = np.unique(np.concatenate([targets, s, d]))
        remap = {g: i for i, g in enumerate(node_ids.tolist())}
        lsrc = np.array([remap[v] for v in s.tolist()], dtype=np.int64)
        ldst = np.array([remap[v] for v in d.tolist()], dtype=np.int64)
        return node_ids, lsrc, ldst

    # -- conversion -------------------------------------------------------
    @staticmethod
    def from_spark(nodes: DataFrame, edges: DataFrame) -> "LocalGraph":
        """Collect small Spark node/edge tables into a LocalGraph.

        ``nodes`` must have contiguous ids ``0..n-1``; optional ``label``
        (int) or ``labels`` (array) and ``split`` columns are carried over.
        """
        npdf = nodes.toPandas().sort_values("id").reset_index(drop=True)
        if not (npdf["id"].to_numpy() == np.arange(len(npdf))).all():
            raise ValueError("node ids must be contiguous 0..n-1")
        # canonical edge order: Spark's collect order varies run to run,
        # which would silently change k-hop sampling (and thus training
        # trajectories) between otherwise identical runs
        epdf = (
            edges.select("src", "dst")
            .toPandas()
            .sort_values(["src", "dst"], kind="stable")
            .reset_index(drop=True)
        )
        labels = None
        if "label" in npdf.columns:
            labels = npdf["label"].to_numpy(dtype=np.int64)
        elif "labels" in npdf.columns:
            labels = np.stack(npdf["labels"].to_numpy()).astype(np.int64)
        split = npdf["split"].to_numpy() if "split" in npdf.columns else None
        return LocalGraph(
            feat=np.stack(npdf["feat"].to_numpy()),
            src=epdf["src"].to_numpy(),
            dst=epdf["dst"].to_numpy(),
            labels=labels,
            split=split,
        )

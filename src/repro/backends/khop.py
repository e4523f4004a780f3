"""Traditional training-style inference pipeline — the paper's baseline.

This reproduces what PyG/DGL-style systems do at inference time (paper
§I, §V): for every target node, build its (sampled) k-hop in-neighborhood
by iterative frontier expansion, then run a localized forward pass of the
full k-layer GNN on that little subgraph. Two defining pathologies are
faithfully present:

* **Redundant computation** — overlapping neighborhoods of different
  targets are each processed independently; the total row count grows
  like ``Σ fanout^k`` per target rather than ``k·|E|`` total.
* **Stochastic predictions** — when a node has more than ``fanout``
  in-neighbors, a per-``seed`` deterministic sample is taken, so
  different run seeds can flip predictions (the paper's Fig. 7
  consistency experiment).

``row_budget`` bounds the materialized neighborhood size; exceeding it
raises :class:`KhopBudgetExceeded`, which the Table IV harness reports as
the paper's OOM cell.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, DoubleType, LongType, StructField, StructType

from repro.backends.common import RunStats, Timer
from repro.core.model import GNNModel


class KhopBudgetExceeded(RuntimeError):
    """The sampled neighborhoods outgrew the row budget (simulated OOM)."""

    def __init__(self, rows: int, budget: int):
        super().__init__(f"k-hop pipeline materialized {rows} rows > budget {budget}")
        self.rows = rows
        self.budget = budget


def sample_khop_edges(
    spark: SparkSession,
    edges: DataFrame,
    targets: DataFrame,
    *,
    hops: int,
    fanout: int,
    seed: int,
    row_budget: int | None = None,
) -> tuple[DataFrame, int]:
    """Sampled k-hop in-neighborhood edges per target.

    Returns ``(sub_edges, total_rows)`` where ``sub_edges`` has columns
    ``(target, src, dst)`` — the union of sampled edges over all hops,
    duplicated per target (that duplication *is* the baseline's
    redundancy). Sampling keeps at most ``fanout`` in-edges per
    ``(target, parent)``, ranked by a seed-keyed hash, so one seed gives
    one deterministic sample and different seeds give different samples.
    """
    frontier = targets.select(F.col("id").alias("target"), F.col("id").alias("node"))
    parts: list[DataFrame] = []
    total_rows = 0
    for _ in range(hops):
        cand = frontier.join(edges, frontier.node == edges.dst).select(
            "target", "src", "dst"
        )
        rank = F.row_number().over(
            Window.partitionBy("target", "dst").orderBy(
                F.xxhash64(F.col("src"), F.col("dst"), F.col("target"), F.lit(seed))
            )
        )
        sampled = cand.withColumn("rk", rank).filter(F.col("rk") <= fanout).drop("rk")
        sampled = sampled.persist()
        hop_rows = sampled.count()
        total_rows += hop_rows
        if row_budget is not None and total_rows > row_budget:
            for p in parts:
                p.unpersist()
            sampled.unpersist()
            raise KhopBudgetExceeded(total_rows, row_budget)
        parts.append(sampled)
        frontier = sampled.select("target", F.col("src").alias("node")).distinct()
    sub = parts[0]
    for p in parts[1:]:
        sub = sub.unionByName(p)
    # materialize once, then release the per-hop caches so repeated
    # pipeline runs don't accumulate executor-memory blocks
    sub = sub.distinct().localCheckpoint(eager=True)
    for p in parts:
        p.unpersist(blocking=False)
    return sub, total_rows


def infer_khop(
    spark: SparkSession,
    nodes: DataFrame,
    edges: DataFrame,
    model: GNNModel,
    *,
    fanout: int,
    seed: int = 0,
    targets: DataFrame | None = None,
    row_budget: int | None = None,
) -> tuple[DataFrame, RunStats]:
    """Baseline inference over all (or the given) target nodes.

    Returns ``(result, stats)``; ``result`` has ``(id, logits, pred)``
    like the InferTurbo backends. ``stats.rounds`` is unused but
    ``stats.total_msg_rows`` records the materialized neighborhood rows
    (the baseline's communication+compute volume).
    """
    stats = RunStats(backend=f"khop(fanout={fanout})")
    with Timer() as t:
        if targets is None:
            targets = nodes.select("id")
        sub, rows = sample_khop_edges(
            spark,
            edges,
            targets,
            hops=model.n_layers,
            fanout=fanout,
            seed=seed,
            row_budget=row_budget,
        )
        # attach features of every node appearing in any subgraph
        members = (
            sub.select("target", F.col("src").alias("id"))
            .unionByName(sub.select("target", F.col("dst").alias("id")))
            .unionByName(targets.select(F.col("id").alias("target"), F.col("id")))
            .distinct()
        )
        feats = members.join(nodes.select("id", "feat"), "id")

        task = model.task
        out_schema = StructType(
            [
                StructField("id", LongType()),
                StructField("logits", ArrayType(DoubleType())),
                StructField(
                    "pred", LongType() if task == "multiclass" else ArrayType(LongType())
                ),
            ]
        )
        sig = model.signature()
        weights = {k: p.data for k, p in model.parameters().items()}

        def localized(left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
            """Forward the k-layer GNN on one target's sampled subgraph."""
            if left.empty:
                return pd.DataFrame(
                    {"id": pd.Series(dtype="int64"), "logits": [], "pred": []}
                )
            mdl = _rebuild(sig, weights)
            tgt = int(left["target"].iloc[0])
            ids = left["id"].to_numpy()
            order = np.argsort(ids)
            ids = ids[order]
            feat = np.stack(left["feat"].to_numpy())[order]
            if right.empty:
                lsrc = np.zeros(0, dtype=np.int64)
                ldst = np.zeros(0, dtype=np.int64)
            else:
                # fixed edge order -> bit-deterministic float reductions
                right = right.sort_values(["dst", "src"], kind="stable")
                lsrc = np.searchsorted(ids, right["src"].to_numpy())
                ldst = np.searchsorted(ids, right["dst"].to_numpy())
            logits = mdl.forward_local(feat, lsrc, ldst).data
            pos = int(np.searchsorted(ids, tgt))
            lg = logits[pos]
            if task == "multiclass":
                return pd.DataFrame({"id": [tgt], "logits": [lg], "pred": [int(lg.argmax())]})
            return pd.DataFrame(
                {"id": [tgt], "logits": [lg], "pred": [(lg > 0).astype("int64")]}
            )

        # rename the key on one side: both frames share lineage through
        # ``sub``, and Spark's ambiguous-self-join check rejects a cogroup
        # on two identically-named columns from the same plan subtree
        sub_renamed = sub.select(
            F.col("target").alias("tgt"), F.col("src"), F.col("dst")
        )
        result = (
            feats.groupBy("target")
            .cogroup(sub_renamed.groupBy("tgt"))
            .applyInPandas(localized, out_schema)
        )
        pdf = result.toPandas()
        sub.unpersist(blocking=False)
        result = spark.createDataFrame(pdf, schema=out_schema)
    stats.wall_s = t.wall_s
    stats.rounds = []
    stats._khop_rows = rows  # type: ignore[attr-defined]
    return result, stats


_MODEL_CACHE: dict[int, GNNModel] = {}


def _rebuild(sig: dict, weights: dict) -> GNNModel:
    """Reconstruct the model from its signature inside executors.

    Models are tiny; a per-process cache avoids rebuilding for each of
    the thousands of target groups.
    """
    key = id(weights)
    mdl = _MODEL_CACHE.get(key)
    if mdl is None:
        from repro.core.gat import GATConv
        from repro.core.model import Dense, GNNModel
        from repro.core.sage import SAGEConv

        layers = []
        for ls in sig["layers"]:
            if ls["kind"] == "sage":
                layers.append(
                    SAGEConv(ls["in_dim"], ls["out_dim"], agg=ls["aggregator"], act=ls["act"])
                )
            else:
                layers.append(
                    GATConv(
                        ls["in_dim"],
                        ls["out_dim"],
                        heads=ls["heads"],
                        act=ls["act"],
                        leaky=ls["leaky"],
                    )
                )
        head = Dense(sig["head"]["in_dim"], sig["head"]["out_dim"])
        mdl = GNNModel(layers, head, task=sig["task"])
        for k, p in mdl.parameters().items():
            p.data = weights[k]
        _MODEL_CACHE.clear()
        _MODEL_CACHE[key] = mdl
    return mdl

"""The Pregel-like graph-processing backend — paper §IV-C1.

A generic superstep engine (:class:`Pregel`) in the "think-like-a-vertex"
style: the graph is hash-partitioned by node id; each partition holds its
vertices' state **and their out-adjacency** ("structure and feature
information stored in one place"); between supersteps only messages move,
optionally pre-reduced by a sender-side *combiner*. Vertex state stays
persisted and co-partitioned across supersteps — the property that makes
this backend faster but more memory-hungry than the MapReduce one.

The engine is validated on classic vertex programs (PageRank, SSSP — see
tests) before carrying GNNs; :func:`infer_pregel` then runs one GAS layer
per superstep, with the paper's combiner trick: the *aggregate* part of a
``partial=True`` layer runs in the combiner.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from repro.backends.common import (
    RoundStats,
    RunStats,
    Timer,
    apply_head,
    count_comm,
    worker_of,
)
from repro.core.model import GNNModel
from repro.graphs import shadow
from repro.strategies import StrategyConfig

VERTEX_SCHEMA = StructType(
    [
        StructField("id", LongType()),
        StructField("pid", LongType()),
        StructField("adj", ArrayType(LongType())),
        StructField("state", ArrayType(DoubleType())),
    ]
)
PMSG_SCHEMA = StructType(
    [
        StructField("src", LongType()),
        StructField("dst", LongType()),
        StructField("payload", ArrayType(DoubleType())),
    ]
)

# compute(step, vertices_pdf, messages_pdf) -> vertices_pdf with new `state`
ComputeFn = Callable[[int, pd.DataFrame, pd.DataFrame], pd.DataFrame]
# message payload from new state: (state_matrix [n,d]) -> payload matrix [n,m]
PayloadFn = Callable[[np.ndarray, np.ndarray], np.ndarray]


def build_vertices(
    spark: SparkSession, nodes: DataFrame, edges: DataFrame, *, state_col: str = "feat"
) -> DataFrame:
    """Partition the graph Pregel-style: each vertex row carries its id,
    partition, out-adjacency list, and state (initialized from a node
    column)."""
    adj = edges.groupBy(F.col("src").alias("id")).agg(F.collect_list("dst").alias("adj"))
    return (
        nodes.select("id", F.col(state_col).alias("state"))
        .join(adj, "id", "left")
        .select(
            "id",
            worker_of(F.col("id")).alias("pid"),
            F.coalesce("adj", F.array().cast(ArrayType(LongType()))).alias("adj"),
            "state",
        )
    )


class Pregel:
    """Superstep driver over a partitioned vertex DataFrame."""

    def __init__(self, spark: SparkSession, vertices: DataFrame, *, n_partitions: int = 16):
        self.spark = spark
        self.n_partitions = n_partitions
        # localCheckpoint keeps the partitioned state resident in executor
        # memory (the Pregel property) AND truncates plan lineage — without
        # it, iterative supersteps nest plans until the driver OOMs.
        self.vertices = vertices.repartition(n_partitions, "pid").localCheckpoint(eager=True)

    def scatter(self, vertices: DataFrame) -> DataFrame:
        """send_message over all out-edges: (src, dst, payload=state)."""
        return vertices.select(
            F.col("id").alias("src"), F.explode("adj").alias("dst"), F.col("state").alias("payload")
        )

    def superstep(
        self,
        step: int,
        messages: DataFrame,
        compute: ComputeFn,
        *,
        combiner: Callable[[DataFrame], DataFrame] | None = None,
    ) -> DataFrame:
        """Deliver messages, run compute() per partition, persist the new
        vertex frame; returns it (caller decides when to scatter next)."""
        if combiner is not None:
            messages = combiner(messages)
        delivered = messages.withColumn("pid", worker_of(F.col("dst")))

        def run(left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
            if left.empty:
                return left
            return compute(step, left, right)

        old = self.vertices
        new_vertices = (
            old.groupBy("pid")
            .cogroup(delivered.groupBy("pid"))
            .applyInPandas(run, VERTEX_SCHEMA)
            .repartition(self.n_partitions, "pid")
            .localCheckpoint(eager=True)
        )
        old.unpersist(blocking=False)  # release the previous superstep's blocks
        self.vertices = new_vertices
        return new_vertices

    def stop(self) -> None:
        self.vertices.unpersist(blocking=False)


# -- classic vertex programs (substrate validation) ---------------------------


def pagerank(
    spark: SparkSession,
    nodes: DataFrame,
    edges: DataFrame,
    *,
    iterations: int = 10,
    damping: float = 0.85,
) -> DataFrame:
    """PageRank as a Pregel vertex program → (id, rank)."""
    n = nodes.count()
    verts = build_vertices(
        spark, nodes.select("id", F.array(F.lit(1.0)).alias("r")), edges, state_col="r"
    )
    eng = Pregel(spark, verts)

    def compute(step: int, verts: pd.DataFrame, msgs: pd.DataFrame) -> pd.DataFrame:
        ids = verts["id"].to_numpy()
        incoming = np.zeros(len(ids))
        if not msgs.empty:
            pos = {v: i for i, v in enumerate(ids.tolist())}
            seg = msgs["dst"].map(pos).to_numpy(dtype=np.int64)
            np.add.at(incoming, seg, np.stack(msgs["payload"].to_numpy())[:, 0])
        rank = (1 - damping) / n + damping * incoming
        deg = verts["adj"].map(len).to_numpy()
        share = rank / np.maximum(deg, 1)
        out = verts.copy()
        out["state"] = [[r, s] for r, s in zip(rank, share)]
        return out

    def combiner(msgs: DataFrame) -> DataFrame:
        return msgs.groupBy("dst").agg(
            F.array(F.sum(F.col("payload")[0])).alias("payload")
        ).withColumn("src", F.lit(-1)).select("src", "dst", "payload")

    # first superstep has no incoming messages: seed rank 1/n and share
    verts0 = eng.vertices

    def seed(it):
        for pdf in it:
            if pdf.empty:
                yield pdf
                continue
            deg = pdf["adj"].map(len).to_numpy()
            share = (1.0 / n) / np.maximum(deg, 1)
            pdf = pdf.copy()
            pdf["state"] = [[1.0 / n, s] for s in share]
            yield pdf

    eng.vertices = (
        verts0.mapInPandas(seed, VERTEX_SCHEMA)
        .repartition(eng.n_partitions, "pid")
        .localCheckpoint(eager=True)
    )
    verts0.unpersist(blocking=False)

    for step in range(iterations):
        msgs = eng.vertices.select(
            F.col("id").alias("src"),
            F.explode("adj").alias("dst"),
            F.array(F.col("state")[1]).alias("payload"),
        )
        eng.superstep(step, msgs, compute, combiner=combiner)
    out = eng.vertices.select("id", F.col("state")[0].alias("rank"))
    result = out.toPandas()
    eng.stop()
    return spark.createDataFrame(result)


def sssp(
    spark: SparkSession, nodes: DataFrame, edges: DataFrame, *, source: int, max_steps: int = 20
) -> DataFrame:
    """Unweighted single-source shortest paths (BFS) → (id, dist);
    unreachable nodes get dist = -1."""
    INF = 1e18
    verts = build_vertices(
        spark,
        nodes.select(
            "id",
            F.when(F.col("id") == source, F.array(F.lit(0.0)))
            .otherwise(F.array(F.lit(INF)))
            .alias("d"),
        ),
        edges,
        state_col="d",
    )
    eng = Pregel(spark, verts)

    def compute(step: int, verts: pd.DataFrame, msgs: pd.DataFrame) -> pd.DataFrame:
        dist = np.stack(verts["state"].to_numpy())[:, 0]
        if not msgs.empty:
            ids = verts["id"].to_numpy()
            pos = {v: i for i, v in enumerate(ids.tolist())}
            seg = msgs["dst"].map(pos).to_numpy(dtype=np.int64)
            cand = np.full(len(ids), INF)
            np.minimum.at(cand, seg, np.stack(msgs["payload"].to_numpy())[:, 0])
            dist = np.minimum(dist, cand)
        out = verts.copy()
        out["state"] = [[d] for d in dist]
        return out

    def combiner(msgs: DataFrame) -> DataFrame:
        return (
            msgs.groupBy("dst")
            .agg(F.array(F.min(F.col("payload")[0])).alias("payload"))
            .withColumn("src", F.lit(-1))
            .select("src", "dst", "payload")
        )

    for step in range(max_steps):
        msgs = eng.vertices.filter(F.col("state")[0] < INF).select(
            F.col("id").alias("src"),
            F.explode("adj").alias("dst"),
            F.array(F.col("state")[0] + 1).alias("payload"),
        )
        eng.superstep(step, msgs, compute, combiner=combiner)
    out = eng.vertices.select(
        "id",
        F.when(F.col("state")[0] >= INF, F.lit(-1.0))
        .otherwise(F.col("state")[0])
        .alias("dist"),
    )
    result = out.toPandas()
    eng.stop()
    return spark.createDataFrame(result)


# -- GNN inference on the Pregel engine ---------------------------------------


def infer_pregel(
    spark: SparkSession,
    nodes: DataFrame,
    edges: DataFrame,
    model: GNNModel,
    *,
    strategies: StrategyConfig = StrategyConfig.none(),
    n_workers: int = 16,
    instrument: bool = False,
) -> tuple[DataFrame, RunStats]:
    """Full-graph GNN inference, one GAS layer per superstep.

    Superstep k delivers layer k's messages, runs *gather → aggregate →
    apply_node* in ``compute()``, and scatters layer k+1's messages via
    the out-adjacency each vertex holds. The combiner performs the
    *aggregate* stage sender-side when the layer allows it
    (``partial=True`` + partial_gather strategy).
    """
    stats = RunStats(backend="pregel")
    with Timer() as t:
        if strategies.shadow_nodes:
            thr = shadow.shadow_threshold(edges.count(), n_workers, strategies.shadow_lambda)
            nodes, edges, _ = shadow.apply_shadow_nodes(nodes, edges, threshold=thr)
        eng = Pregel(spark, build_vertices(spark, nodes, edges), n_partitions=n_workers)

        for k, layer in enumerate(model.layers):
            msgs = eng.vertices.select(
                F.col("id").alias("src"), F.explode("adj").alias("dst"), F.col("state").alias("payload")
            )
            bcast = None
            if strategies.broadcast and layer.broadcastable:
                # payloads travel once per (src, receiver-partition)
                bcast = (
                    eng.vertices.select(
                        F.col("id").alias("src"), F.explode("adj").alias("dst"), "state"
                    )
                    .select("src", worker_of(F.col("dst")).alias("wdst"), "state")
                    .dropDuplicates(["src", "wdst"])
                )
            if instrument:
                rows, floats = count_comm(
                    msgs, bcast, layer, partial_gather=strategies.partial_gather and layer.partial
                )
                stats.rounds.append(RoundStats(layer=k, msg_rows=rows, msg_floats=floats))

            combiner = None
            if strategies.partial_gather and layer.partial:
                agg = layer.aggregator

                def combine_fn(msgs_df: DataFrame, agg=agg) -> DataFrame:
                    def combine(pdf: pd.DataFrame) -> pd.DataFrame:
                        from repro.backends.common import _sort_msgs

                        pdf = _sort_msgs(pdf)
                        dst = pdf["dst"].to_numpy()
                        uniq, seg = np.unique(dst, return_inverse=True)
                        partials = agg.lift_segments(
                            np.stack(pdf["payload"].to_numpy()), seg, len(uniq)
                        )
                        # sender worker id rides as src so the receiver's
                        # final merge has a deterministic order too
                        return pd.DataFrame(
                            {
                                "src": int(pdf["wsrc"].iloc[0]),
                                "dst": uniq,
                                "payload": list(partials),
                            }
                        )

                    return (
                        msgs_df.withColumn("wsrc", worker_of(F.col("src")))
                        .groupBy("wsrc")
                        .applyInPandas(combine, PMSG_SCHEMA)
                    )

                combiner = combine_fn

            def compute(
                step: int,
                verts: pd.DataFrame,
                msgs_pdf: pd.DataFrame,
                layer=layer,
                combined=combiner is not None,
            ) -> pd.DataFrame:
                from repro.backends.common import _sort_msgs

                if not msgs_pdf.empty:
                    msgs_pdf = _sort_msgs(msgs_pdf)  # bit-deterministic reduce
                verts = verts.sort_values("id", kind="stable")  # bit-stable matmuls
                ids = verts["id"].to_numpy()
                h = np.stack(verts["state"].to_numpy())
                pos = {v: i for i, v in enumerate(ids.tolist())}
                if layer.partial:
                    agg = layer.aggregator
                    aggr = np.zeros((len(ids), agg.dim))
                    if not msgs_pdf.empty:
                        seg = msgs_pdf["dst"].map(pos).to_numpy(dtype=np.int64)
                        vals = np.stack(msgs_pdf["payload"].to_numpy())
                        if combined:
                            partials = agg.merge_segments(vals, seg, len(ids))
                        else:
                            partials = agg.lift_segments(vals, seg, len(ids))
                        got = np.zeros(len(ids), dtype=bool)
                        got[np.unique(seg)] = True
                        fin = agg.finalize(partials)
                        aggr[got] = fin[got]
                    new_h = layer.apply_node(h, aggr)
                else:
                    if msgs_pdf.empty:
                        m = np.zeros((0, layer.msg_dim))
                        seg = np.zeros(0, dtype=np.int64)
                    else:
                        seg = msgs_pdf["dst"].map(pos).to_numpy(dtype=np.int64)
                        m = np.stack(msgs_pdf["payload"].to_numpy())
                    new_h = layer.apply_node_union(h, m, seg)
                out = verts.copy()
                out["state"] = list(new_h)
                return out

            eng.superstep(k, msgs, compute, combiner=combiner)

        result = apply_head(
            eng.vertices.select("id", F.col("state").alias("h")), model
        )
        if strategies.shadow_nodes:
            result = shadow.drop_mirrors(result)
        pdf = result.toPandas()
        eng.stop()
        result = spark.createDataFrame(pdf)
    stats.wall_s = t.wall_s
    return result, stats

"""The batch-processing (MapReduce/Spark) backend — paper §IV-C2.

Defining property: **nothing lives in memory between rounds**. The map
phase materializes the initial node state to external storage (Parquet);
each reduce round reads the previous state and the edge table back from
storage, performs one GAS layer, and writes the new state out. The last
round additionally applies the prediction slice of the model.

This is deliberately heavier on IO than the Pregel backend and lighter
on resident memory — matching the paper's trade-off (Table III: On-MR
slower than On-Pregel, but the backend of choice for the largest
graphs).
"""
from __future__ import annotations

import shutil
from pathlib import Path

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.backends.common import (
    RoundStats,
    RunStats,
    Timer,
    apply_head,
    apply_layer,
    count_comm,
    scatter_messages,
)
from repro.core.model import GNNModel
from repro.graphs import shadow
from repro.strategies import StrategyConfig


def infer_mr(
    spark: SparkSession,
    nodes: DataFrame,
    edges: DataFrame,
    model: GNNModel,
    *,
    workdir: str | Path,
    strategies: StrategyConfig = StrategyConfig.none(),
    n_workers: int = 16,
    n_buckets: int = 64,
    instrument: bool = False,
) -> tuple[DataFrame, RunStats]:
    """Full-graph inference on the MapReduce backend.

    Returns ``(result, stats)`` where ``result`` has columns
    ``(id, logits, pred)`` for every node (mirror rows already dropped).
    """
    workdir = Path(workdir)
    if workdir.exists():
        shutil.rmtree(workdir)
    workdir.mkdir(parents=True)
    stats = RunStats(backend="mapreduce")

    with Timer() as t:
        if strategies.shadow_nodes:
            thr = shadow.shadow_threshold(edges.count(), n_workers, strategies.shadow_lambda)
            nodes, edges, _ = shadow.apply_shadow_nodes(nodes, edges, threshold=thr)

        edges_path = str(workdir / "edges.parquet")
        edges.select("src", "dst").write.mode("overwrite").parquet(edges_path)

        # Map phase: initial state h0 = x to external storage.
        state_path = str(workdir / "state_0.parquet")
        nodes.select("id", F.col("feat").alias("h")).write.mode("overwrite").parquet(state_path)

        for k, layer in enumerate(model.layers):
            state = spark.read.parquet(state_path)
            edge_t = spark.read.parquet(edges_path)
            msgs, bcast = scatter_messages(
                edge_t, state, layer, broadcast=strategies.broadcast
            )
            if instrument:
                rows, floats = count_comm(
                    msgs, bcast, layer, partial_gather=strategies.partial_gather
                )
                stats.rounds.append(RoundStats(layer=k, msg_rows=rows, msg_floats=floats))
            new_state = apply_layer(
                state,
                msgs,
                layer,
                partial_gather=strategies.partial_gather,
                n_buckets=n_buckets,
            )
            state_path = str(workdir / f"state_{k + 1}.parquet")
            new_state.write.mode("overwrite").parquet(state_path)

        # Final reduce carries the prediction slice.
        result = apply_head(spark.read.parquet(state_path), model)
        if strategies.shadow_nodes:
            result = shadow.drop_mirrors(result)
        out_path = str(workdir / "result.parquet")
        result.write.mode("overwrite").parquet(out_path)
        result = spark.read.parquet(out_path)
    stats.wall_s = t.wall_s
    return result, stats

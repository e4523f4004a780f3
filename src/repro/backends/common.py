"""Shared GAS data-flow machinery for the MapReduce and Pregel backends.

This module owns the two *data-flow* stages of the abstraction —
``gather_nbrs`` (receive + vectorize) and ``scatter_nbrs`` (send) — plus
the logical-worker model and communication instrumentation:

* **Logical workers.** The paper runs on ~1000 instances; locally we
  simulate placement with ``worker(id) = pmod(xxhash64(id), W)``
  (W = 16). Strategy semantics (combine per sender worker, broadcast per
  receiver worker) and all communication metrics are defined against
  these logical workers, so the measured message/byte reductions are
  exact and machine-independent.
* **Vectorized gather.** Messages are grouped by a destination bucket
  (not per node) and reduced with NumPy segment ops inside
  ``applyInPandas`` — hundreds of destinations per Arrow batch instead
  of one Python call per node.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, DoubleType, LongType, StructField, StructType

from repro.core.gas import GASLayer
from repro.core.model import GNNModel
from repro.strategies import StrategyConfig

N_WORKERS = 16

STATE_SCHEMA = StructType(
    [StructField("id", LongType()), StructField("h", ArrayType(DoubleType()))]
)
MSG_SCHEMA = StructType(
    [
        StructField("src", LongType()),
        StructField("dst", LongType()),
        StructField("payload", ArrayType(DoubleType())),
    ]
)


def worker_of(col):
    """Logical worker (simulated machine) hosting a node id."""
    return F.pmod(F.xxhash64(col), F.lit(N_WORKERS))


@dataclass
class RoundStats:
    """Communication accounting for one layer/superstep."""

    layer: int
    msg_rows: int = 0  # rows crossing the gather shuffle
    msg_floats: int = 0  # payload doubles shipped (excl. 16B of ids/row)

    @property
    def msg_bytes(self) -> int:
        return self.msg_rows * 16 + self.msg_floats * 8


@dataclass
class RunStats:
    """Wall-clock + communication profile of one inference run."""

    backend: str
    wall_s: float = 0.0
    rounds: list[RoundStats] = field(default_factory=list)

    @property
    def total_msg_rows(self) -> int:
        return sum(r.msg_rows for r in self.rounds)

    @property
    def total_msg_bytes(self) -> int:
        return sum(r.msg_bytes for r in self.rounds)

    def cpu_min(self, cores: int = 16) -> float:
        """Paper-style resource accounting: the whole (simulated) cluster
        is held for the duration of the job."""
        return self.wall_s * cores / 60.0


def _stack(col: pd.Series, dim: int) -> np.ndarray:
    """Column of array<double> -> [n, dim] float matrix."""
    if len(col) == 0:
        return np.zeros((0, dim))
    return np.stack(col.to_numpy()).astype(np.float64, copy=False)


# -- scatter_nbrs (data flow, send side) -------------------------------------


def scatter_messages(
    edges: DataFrame,
    state: DataFrame,
    layer: GASLayer,
    *,
    broadcast: bool,
) -> tuple[DataFrame, DataFrame | None]:
    """Produce the message table ``(src, dst, payload)`` for one layer.

    Plain path: one payload per edge (``edges ⋈ state on src``).

    Broadcast path (legal when the layer is ``broadcastable``): the
    payload travels once per ``(src, dst_worker)`` in a deduped
    *broadcast table*; receivers re-attach payloads to their edges by a
    worker-local join. Returns ``(messages, broadcast_table)`` — the
    second element is what actually crossed the network, ``None`` on the
    plain path.
    """
    # scatter()/apply_edge are identity for SAGE/GAT without edge feats,
    # so the payload is the node state itself.
    if broadcast and layer.broadcastable:
        pairs = edges.select("src", worker_of(F.col("dst")).alias("wdst")).distinct()
        bcast = pairs.join(state, pairs.src == state.id).select(
            "src", "wdst", F.col("h").alias("payload")
        )
        msgs = (
            edges.withColumn("wdst", worker_of(F.col("dst")))
            .join(bcast, ["src", "wdst"])
            .select("src", "dst", "payload")
        )
        return msgs, bcast
    msgs = edges.join(state, edges.src == state.id).select(
        "src", "dst", F.col("h").alias("payload")
    )
    return msgs, None


# -- gather_nbrs + aggregate (data flow + computation, receive side) ---------


def _sort_msgs(pdf: pd.DataFrame) -> pd.DataFrame:
    """Fix the reduction order of a message batch.

    Floating-point addition is not associative, so aggregating in shuffle
    arrival order makes repeated runs differ in the last ulp. Sorting by
    (dst, src) before every reduction makes results **bit-identical**
    across runs — the consistency guarantee of §V-B1, at full strength.
    """
    keys = [k for k in ("dst", "src") if k in pdf.columns]
    return pdf.sort_values(keys, kind="stable")


def _partial_stage(msgs: DataFrame, layer: GASLayer) -> DataFrame:
    """Sender-side combine: one partial per ``(worker(src), dst)``.

    This is the paper's *partial-gather* / Pregel-combiner stage — legal
    because the layer's aggregate is commutative + associative. The
    sender worker id rides along as ``src`` so the receiver's final merge
    has a deterministic order too.
    """
    agg = layer.aggregator
    out_schema = StructType(
        [
            StructField("src", LongType()),
            StructField("dst", LongType()),
            StructField("payload", ArrayType(DoubleType())),
        ]
    )

    def combine(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = _sort_msgs(pdf)
        dst = pdf["dst"].to_numpy()
        uniq, seg = np.unique(dst, return_inverse=True)
        partials = agg.lift_segments(_stack(pdf["payload"], agg.dim), seg, len(uniq))
        return pd.DataFrame(
            {"src": int(pdf["wsrc"].iloc[0]), "dst": uniq, "payload": list(partials)}
        )

    return (
        msgs.withColumn("wsrc", worker_of(F.col("src")))
        .groupBy("wsrc")
        .applyInPandas(combine, out_schema)
    )


def gather_aggregate(
    msgs: DataFrame,
    layer: GASLayer,
    *,
    partial_gather: bool,
    n_buckets: int = 64,
) -> tuple[DataFrame, bool]:
    """Aggregate the message table down to ``(dst, aggr)``.

    Returns ``(aggr_df, used_partial)``. For non-partial layers (union
    aggregate) this is an identity — the caller must use the union path.
    """
    if not layer.partial:
        return msgs, False
    agg = layer.aggregator
    lifted = False
    if partial_gather:
        msgs = _partial_stage(msgs, layer)
        lifted = True
    out_schema = StructType(
        [StructField("dst", LongType()), StructField("aggr", ArrayType(DoubleType()))]
    )

    merge_partials = lifted  # captured, not a parameter: applyInPandas
    # passes (key, pdf) to two-argument functions

    def finish(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = _sort_msgs(pdf)
        dst = pdf["dst"].to_numpy()
        uniq, seg = np.unique(dst, return_inverse=True)
        dim = agg.partial_dim if merge_partials else agg.dim
        vals = _stack(pdf["payload"], dim)
        if merge_partials:
            partials = agg.merge_segments(vals, seg, len(uniq))
        else:
            partials = agg.lift_segments(vals, seg, len(uniq))
        return pd.DataFrame({"dst": uniq, "aggr": list(agg.finalize(partials))})

    aggr = (
        msgs.withColumn("bkt", F.pmod(F.xxhash64(F.col("dst")), F.lit(n_buckets)))
        .groupBy("bkt")
        .applyInPandas(finish, out_schema)
    )
    return aggr, True


def apply_layer(
    state: DataFrame,
    msgs: DataFrame,
    layer: GASLayer,
    *,
    partial_gather: bool,
    n_buckets: int = 64,
) -> DataFrame:
    """Run gather/aggregate/apply_node for one layer → new state table.

    ``state``: ``(id, h)``; ``msgs``: ``(src, dst, payload)``. Partial
    layers reduce first and join the compact aggregate back to the state;
    union layers cogroup raw messages with destination states and run
    ``apply_node_union`` per destination bucket.
    """
    bucket = lambda c: F.pmod(F.xxhash64(c), F.lit(n_buckets))  # noqa: E731

    if layer.partial:
        aggr, _ = gather_aggregate(msgs, layer, partial_gather=partial_gather, n_buckets=n_buckets)

        def node_update(left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
            if left.empty:
                return pd.DataFrame({"id": [], "h": []}).astype({"id": "int64"})
            # canonical row order: SIMD matmul kernels are not bit-stable
            # under row permutation, and batch row order varies with
            # shuffle arrival
            left = left.sort_values("id", kind="stable")
            h = _stack(left["h"], layer.in_dim)
            ids = left["id"].to_numpy()
            aggr_m = np.zeros((len(ids), layer.aggregator.dim))
            if not right.empty:
                pos = {v: i for i, v in enumerate(ids.tolist())}
                idx = right["dst"].map(pos).to_numpy()
                aggr_m[idx] = _stack(right["aggr"], layer.aggregator.dim)
            new_h = layer.apply_node(h, aggr_m)
            return pd.DataFrame({"id": ids, "h": list(new_h)})

        return (
            state.groupBy(bucket(F.col("id")))
            .cogroup(aggr.groupBy(bucket(F.col("dst"))))
            .applyInPandas(node_update, STATE_SCHEMA)
        )

    # union path (e.g. GAT): attention needs every message plus dst state
    def union_update(left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
        if left.empty:
            return pd.DataFrame({"id": [], "h": []}).astype({"id": "int64"})
        left = left.sort_values("id", kind="stable")  # bit-stable matmuls
        ids = left["id"].to_numpy()
        h = _stack(left["h"], layer.in_dim)
        if right.empty:
            m = np.zeros((0, layer.msg_dim))
            seg = np.zeros(0, dtype=np.int64)
        else:
            right = _sort_msgs(right)
            pos = {v: i for i, v in enumerate(ids.tolist())}
            seg = right["dst"].map(pos).to_numpy(dtype=np.int64)
            m = _stack(right["payload"], layer.msg_dim)
        new_h = layer.apply_node_union(h, m, seg)
        return pd.DataFrame({"id": ids, "h": list(new_h)})

    return (
        state.groupBy(bucket(F.col("id")))
        .cogroup(msgs.groupBy(bucket(F.col("dst"))))
        .applyInPandas(union_update, STATE_SCHEMA)
    )


def apply_head(state: DataFrame, model: GNNModel, *, n_buckets: int = 64) -> DataFrame:
    """Attach the prediction slice to the final state (paper: the last
    superstep/reduce carries the prediction part of the model).

    Batches are formed by a deterministic id bucket and sorted by id, so
    the final logits are bit-identical across runs (SIMD matmuls are not
    bit-stable under batch-composition changes).
    """
    head = model.head
    task = model.task
    w, b = head.params["w"].data, head.params["b"].data
    out_schema = StructType(
        [
            StructField("id", LongType()),
            StructField("logits", ArrayType(DoubleType())),
            StructField("pred", LongType() if task == "multiclass" else ArrayType(LongType())),
        ]
    )

    def predict(pdf: pd.DataFrame) -> pd.DataFrame:
        if pdf.empty:
            return pd.DataFrame({"id": pd.Series(dtype="int64"), "logits": [], "pred": []})
        pdf = pdf.sort_values("id", kind="stable")
        h = _stack(pdf["h"], w.shape[0])
        logits = h @ w + b
        if task == "multiclass":
            return pd.DataFrame(
                {"id": pdf["id"], "logits": list(logits), "pred": logits.argmax(axis=1)}
            )
        return pd.DataFrame(
            {
                "id": pdf["id"],
                "logits": list(logits),
                "pred": list((logits > 0).astype("int64")),
            }
        )

    return (
        state.groupBy(F.pmod(F.xxhash64(F.col("id")), F.lit(n_buckets)))
        .applyInPandas(predict, out_schema)
    )


def count_comm(
    msgs: DataFrame, bcast: DataFrame | None, layer: GASLayer, *, partial_gather: bool
) -> tuple[int, int]:
    """Exact (rows, payload_floats) crossing logical workers this layer.

    * broadcast on → the broadcast table carries the payloads; the edge
      stream ships ids only.
    * partial-gather on → payload rows are the sender-side partials,
      one per ``(worker(src), dst)``.
    """
    if bcast is not None:
        rows = int(bcast.count())
        return rows, rows * layer.msg_dim
    if layer.partial and partial_gather:
        rows = int(
            msgs.select(worker_of(F.col("src")).alias("w"), "dst").distinct().count()
        )
        return rows, rows * layer.aggregator.partial_dim
    rows = int(msgs.count())
    return rows, rows * layer.msg_dim


def per_worker_io(msgs: DataFrame) -> pd.DataFrame:
    """Messages received per logical worker (straggler/tail analysis)."""
    return (
        msgs.groupBy(worker_of(F.col("dst")).alias("worker"))
        .agg(F.count("*").alias("in_msgs"))
        .toPandas()
        .sort_values("worker")
        .reset_index(drop=True)
    )


class Timer:
    """Context manager measuring wall seconds."""

    def __enter__(self):
        self.t0 = time.perf_counter()
        return self

    def __exit__(self, *exc):
        self.wall_s = time.perf_counter() - self.t0

"""Table II — Performance (prediction quality).

For each (algorithm × dataset): train one model mini-batch with k-hop
sampling (the paper's shared training pipeline), then infer three ways —

* ``PyG``-like and ``DGL``-like stand-ins: the traditional sampled k-hop
  inference pipeline at fanout 25, two independent sampling runs (the
  two baseline systems differ only in engineering, not math, so two
  sampling seeds is the honest local analogue);
* ``Ours``: InferTurbo full-graph inference (MapReduce backend).

The paper's claim is *comparability* — all three columns should be close
because the trained computation flow is identical.

Run: ``python jobs/table2_performance.py [scale]``
"""
from __future__ import annotations

import sys
import tempfile

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.backends.khop import infer_khop
from repro.backends.mapreduce import infer_mr
from repro.core.evaluation import score
from repro.core.model import build_gat, build_sage
from repro.core.training import train_model
from repro.graphs import datasets
from repro.graphs.local import LocalGraph

PAPER = {  # Table II of the paper
    ("SAGE", "ppi_lite"): {"PyG": 0.878, "DGL": 0.878, "Ours": 0.880},
    ("SAGE", "products_lite"): {"PyG": 0.787, "DGL": 0.790, "Ours": 0.788},
    ("SAGE", "mag_lite"): {"PyG": 0.662, "DGL": 0.664, "Ours": 0.668},
    ("GAT", "ppi_lite"): {"PyG": 0.987, "DGL": 0.981, "Ours": 0.986},
    ("GAT", "products_lite"): {"PyG": 0.794, "DGL": 0.800, "Ours": 0.801},
    ("GAT", "mag_lite"): {"PyG": 0.663, "DGL": 0.659, "Ours": 0.670},
}


def _metric_on_test(pdf, g: LocalGraph, task: str) -> float:
    pdf = pdf.sort_values("id")
    ids = pdf["id"].to_numpy()
    mask = g.mask("test")[ids]
    if task == "multilabel":
        pred = np.stack(pdf["pred"].to_numpy())
    else:
        pred = pdf["pred"].to_numpy()
    return score(task, pred[mask], g.labels[ids][mask])


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    epochs: int = 15,
    hidden: int = 24,
    fanout_infer: int = 25,
) -> list[dict]:
    rows = []
    for ds_name in datasets.ALL_METAS:
        nodes, edges, meta = datasets.load(spark, ds_name, scale=scale)
        g = LocalGraph.from_spark(nodes, edges)
        task = "multilabel" if meta.multilabel else "multiclass"
        test_targets = nodes.filter(F.col("split") == "test").select("id")
        for algo in ("SAGE", "GAT"):
            if algo == "SAGE":
                model = build_sage(meta.feat_dim, hidden, meta.n_classes, task=task, seed=1)
            else:
                model = build_gat(
                    meta.feat_dim, hidden, meta.n_classes, heads=2, task=task, seed=1
                )
            train_model(
                model, g, epochs=epochs, batch_size=64, fanout=10, lr=0.01, seed=0
            )
            # two independent sampled-inference runs stand in for PyG / DGL
            scores = {}
            for col, seed in (("PyG", 11), ("DGL", 22)):
                res, _ = infer_khop(
                    spark,
                    nodes,
                    edges,
                    model,
                    fanout=fanout_infer,
                    seed=seed,
                    targets=test_targets,
                )
                scores[col] = _metric_on_test(res.toPandas(), g, task)
            with tempfile.TemporaryDirectory() as tmp:
                res, _ = infer_mr(spark, nodes, edges, model, workdir=tmp)
                scores["Ours"] = _metric_on_test(res.toPandas(), g, task)
            paper = PAPER[(algo, ds_name)]
            rows.append(
                {
                    "algo": algo,
                    "dataset": ds_name,
                    "metric": "micro-F1" if task == "multilabel" else "accuracy",
                    "PyG-like": round(scores["PyG"], 3),
                    "DGL-like": round(scores["DGL"], 3),
                    "Ours": round(scores["Ours"], 3),
                    "paper PyG": paper["PyG"],
                    "paper DGL": paper["DGL"],
                    "paper Ours": paper["Ours"],
                }
            )
    return rows


if __name__ == "__main__":
    sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
    from _session import get_session, print_table

    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_session("table2")
    print_table("Table II — prediction performance (ours vs paper)", run(spark, scale=scale))
    spark.stop()

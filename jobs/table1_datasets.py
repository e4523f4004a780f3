"""Table I — Summary of datasets.

Prints our synthetic stand-ins' statistics next to the paper's original
dataset sizes, so the scale-down factors are explicit.

Run: ``python jobs/table1_datasets.py [scale]``
"""
from __future__ import annotations

import sys

from pyspark.sql import SparkSession

from repro.graphs import datasets
from repro.graphs.generators import power_law_graph
from repro.graphs.stats import summarize

# the paper's Power-Law row (largest synthesized instance)
PAPER_POWER_LAW = {"nodes": 1e10, "edges": 1e11, "feat": 200, "classes": 2}


def run(spark: SparkSession, *, scale: float = 1.0, pl_nodes: int = 20_000) -> list[dict]:
    """Summarize every dataset; returns one row per dataset."""
    rows = []
    for name in datasets.ALL_METAS:
        nodes, edges, meta = datasets.load(spark, name, scale=scale)
        s = summarize(nodes, edges)
        rows.append(
            {
                "dataset": name,
                "#Node": s["n_nodes"],
                "#Edge": s["n_edges"],
                "#NodeFeature": s["feat_dim"],
                "#Class": meta.n_classes,
                "max_in": s["max_in_degree"],
                "max_out": s["max_out_degree"],
                "paper #Node": int(meta.paper_nodes),
                "paper #Edge": int(meta.paper_edges),
                "paper #Feat": meta.paper_feat,
                "paper #Class": meta.paper_classes,
            }
        )
    nodes, edges = power_law_graph(
        spark, n_nodes=pl_nodes, avg_degree=10, skew="both", alpha=1.1, feat_dim=16, seed=0
    )
    s = summarize(nodes, edges)
    rows.append(
        {
            "dataset": "power_law",
            "#Node": s["n_nodes"],
            "#Edge": s["n_edges"],
            "#NodeFeature": s["feat_dim"],
            "#Class": 2,
            "max_in": s["max_in_degree"],
            "max_out": s["max_out_degree"],
            "paper #Node": int(PAPER_POWER_LAW["nodes"]),
            "paper #Edge": int(PAPER_POWER_LAW["edges"]),
            "paper #Feat": PAPER_POWER_LAW["feat"],
            "paper #Class": PAPER_POWER_LAW["classes"],
        }
    )
    return rows


if __name__ == "__main__":
    sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
    from _session import get_session, print_table

    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_session("table1")
    print_table("Table I — dataset summary (ours vs paper)", run(spark, scale=scale))
    spark.stop()

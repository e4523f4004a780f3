"""Graph summary statistics — the machinery behind Table I.

All aggregations here are plain Spark SQL over the node/edge tables and
are cross-checked against DuckDB by the oracle in tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def in_degrees(edges: DataFrame) -> DataFrame:
    """(id, in_deg) for every node that has at least one in-edge."""
    return edges.groupBy(F.col("dst").alias("id")).agg(F.count("*").alias("in_deg"))


def out_degrees(edges: DataFrame) -> DataFrame:
    """(id, out_deg) for every node that has at least one out-edge."""
    return edges.groupBy(F.col("src").alias("id")).agg(F.count("*").alias("out_deg"))


def summarize(nodes: DataFrame, edges: DataFrame) -> dict:
    """Table-I-style summary of one dataset."""
    n = nodes.count()
    e = edges.count()
    row = nodes.select(F.size("feat").alias("d")).first()
    deg = (
        in_degrees(edges)
        .agg(F.max("in_deg").alias("max_in"))
        .crossJoin(out_degrees(edges).agg(F.max("out_deg").alias("max_out")))
        .first()
    )
    out = {
        "n_nodes": n,
        "n_edges": e,
        "feat_dim": int(row["d"]),
        "avg_degree": round(e / n, 2),
        "max_in_degree": int(deg["max_in"]),
        "max_out_degree": int(deg["max_out"]),
    }
    if "label" in nodes.columns:
        out["n_classes"] = nodes.agg(F.countDistinct("label")).first()[0]
    elif "labels" in nodes.columns:
        out["n_classes"] = int(nodes.select(F.size("labels").alias("L")).first()["L"])
    return out

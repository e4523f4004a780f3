"""Shadow-nodes preprocessing: hub splitting is load-balancing without
changing semantics (paper §IV-D-c)."""
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import power_law_graph
from repro.graphs.shadow import (
    SHADOW_BASE,
    apply_shadow_nodes,
    drop_mirrors,
    mirror_group,
    original_id,
    shadow_threshold,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def skewed(spark):
    """Out-degree-skewed graph with real hubs."""
    return power_law_graph(
        spark, n_nodes=800, avg_degree=6, skew="out", alpha=1.4, feat_dim=4, seed=2
    )


@pytest.fixture(scope="module")
def shadowed(skewed):
    nodes, edges = skewed
    out = apply_shadow_nodes(nodes, edges, threshold=50)
    return skewed, out


def test_threshold_heuristic():
    # paper: threshold = lambda * total_edges / total_workers, lambda=0.1
    assert shadow_threshold(1_000_000_000, 1000) == 100_000
    assert shadow_threshold(10, 1000) == 1  # floor at 1


def test_hubs_detected(shadowed):
    (_, edges), (_, _, n_hubs) = shadowed
    expect = edges.groupBy("src").count().filter("count > 50").count()
    assert n_hubs == expect and n_hubs > 0


def test_mirror_out_degree_bounded(shadowed):
    """Each (possibly mirrored) node keeps <= threshold out-edges toward
    original destinations. (Duplicated in-edges toward mirrors add
    out-edges to hub *senders* — the paper's acknowledged overhead — so
    they are excluded from the bound.)"""
    (_, _), (_, edges2, _) = shadowed
    max_out = (
        edges2.filter(F.col("dst") < SHADOW_BASE)
        .groupBy("src")
        .count()
        .agg(F.max("count"))
        .first()[0]
    )
    assert max_out <= 50


def test_total_out_edges_preserved(shadowed):
    """Splitting only redistributes original out-edges over mirrors."""
    (_, edges), (_, edges2, _) = shadowed
    orig = edges.count()
    # exclude the duplicated in-edges of mirrors (dst is a mirror id)
    split_out = edges2.filter(F.col("dst") < SHADOW_BASE).count()
    assert split_out == orig


def test_out_edge_multiset_preserved_oracle(shadowed):
    """Collapsing mirror ids back must give exactly the original edges."""
    (_, edges), (_, edges2, _) = shadowed
    collapsed = edges2.filter(F.col("dst") < SHADOW_BASE).select(
        original_id(F.col("src")).alias("src"), "dst"
    )
    assert_equivalent(
        collapsed.groupBy("src", "dst").agg(F.count("*").alias("cnt")),
        "select src, dst, count(*) as cnt from edges group by src, dst",
        edges=edges,
    )


def test_mirrors_have_all_in_edges(shadowed):
    """Every mirror must receive a copy of each in-edge of its original."""
    (_, edges), (nodes2, edges2, _) = shadowed
    mirrors = nodes2.filter(F.col("id") >= SHADOW_BASE).select(
        original_id(F.col("id")).alias("orig"), F.col("id").alias("mirror")
    )
    orig_in = edges.groupBy(F.col("dst").alias("orig")).agg(
        F.count("*").alias("want")
    )
    mirror_in = edges2.filter(F.col("dst") >= SHADOW_BASE).groupBy(
        F.col("dst").alias("mirror")
    ).agg(F.count("*").alias("got"))
    joined = (
        mirrors.join(orig_in, "orig", "left")
        .join(mirror_in, "mirror", "left")
        .fillna(0, subset=["want", "got"])
    )
    assert joined.filter("want != got").count() == 0


def test_mirror_nodes_copy_features(shadowed):
    (_, _), (nodes2, _, _) = shadowed
    mirrors = nodes2.filter(F.col("id") >= SHADOW_BASE).select(
        original_id(F.col("id")).alias("id"), F.col("feat").alias("mfeat")
    )
    joined = mirrors.join(nodes2.filter(F.col("id") < SHADOW_BASE), "id")
    bad = joined.filter(F.col("feat") != F.col("mfeat")).count()
    assert bad == 0


def test_id_encoding_roundtrip(spark):
    df = spark.range(5).select(
        (F.col("id") + 3 * SHADOW_BASE).alias("mid")
    )
    got = df.select(
        original_id(F.col("mid")).alias("orig"), mirror_group(F.col("mid")).alias("g")
    ).collect()
    assert all(r["g"] == 3 for r in got)
    assert sorted(r["orig"] for r in got) == [0, 1, 2, 3, 4]


def test_noop_when_no_hubs(spark):
    nodes, edges = power_law_graph(
        spark, n_nodes=100, avg_degree=3, skew="none", feat_dim=4, seed=1
    )
    n2, e2, n_hubs = apply_shadow_nodes(nodes, edges, threshold=10**9)
    assert n_hubs == 0
    assert n2 is nodes and e2 is edges


def test_drop_mirrors(shadowed):
    (nodes, _), (nodes2, _, _) = shadowed
    kept = drop_mirrors(nodes2)
    assert kept.count() == nodes.count()

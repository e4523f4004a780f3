"""Graph summary statistics (Table I machinery), oracle-checked."""
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import power_law_graph
from repro.graphs.stats import in_degrees, out_degrees, summarize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def graph(spark):
    return power_law_graph(
        spark, n_nodes=300, avg_degree=5, skew="in", alpha=1.3, feat_dim=7, seed=17
    )


def test_summary_fields(graph):
    nodes, edges = graph
    s = summarize(nodes, edges)
    assert s["n_nodes"] == 300
    assert s["n_edges"] == edges.count()
    assert s["feat_dim"] == 7
    assert s["avg_degree"] == pytest.approx(s["n_edges"] / 300, abs=0.01)


def test_max_degrees_oracle(graph):
    nodes, edges = graph
    s = summarize(nodes, edges)
    got = edges.groupBy("dst").count().agg(F.max("count").alias("m"))
    assert_equivalent(
        got,
        "select max(c) as m from (select count(*) as c from edges group by dst)",
        edges=edges,
    )
    assert s["max_in_degree"] == got.first()["m"]


def test_in_out_degree_totals_match(graph):
    _, edges = graph
    tot_in = in_degrees(edges).agg(F.sum("in_deg")).first()[0]
    tot_out = out_degrees(edges).agg(F.sum("out_deg")).first()[0]
    assert tot_in == tot_out == edges.count()


def test_summary_with_labels(spark):
    from repro.graphs import datasets

    nodes, edges, meta = datasets.load(spark, "products_lite", scale=0.05, seed=1)
    s = summarize(nodes, edges)
    assert 1 < s["n_classes"] <= meta.n_classes


def test_in_skew_visible_in_summary(graph):
    nodes, edges = graph
    s = summarize(nodes, edges)
    assert s["max_in_degree"] > 5 * s["avg_degree"]

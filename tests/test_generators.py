"""Synthetic graph generators: determinism, skew control, hygiene.

Relational facts (degrees, counts) are cross-checked against DuckDB via
the oracle.
"""
import numpy as np
import pytest

from repro.graphs.generators import planted_labels, power_law_graph, uniform_graph
from repro.graphs.stats import in_degrees, out_degrees
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pl_graph(spark):
    return power_law_graph(
        spark, n_nodes=400, avg_degree=6, skew="both", feat_dim=8, seed=5
    )


def test_deterministic_in_seed(spark):
    a_n, a_e = power_law_graph(spark, n_nodes=100, avg_degree=4, seed=9)
    b_n, b_e = power_law_graph(spark, n_nodes=100, avg_degree=4, seed=9)
    assert a_e.toPandas().equals(b_e.toPandas())
    assert a_n.toPandas().equals(b_n.toPandas())


def test_different_seeds_differ(spark):
    a = power_law_graph(spark, n_nodes=100, avg_degree=4, seed=1)[1].toPandas()
    b = power_law_graph(spark, n_nodes=100, avg_degree=4, seed=2)[1].toPandas()
    assert not a.equals(b)


def test_no_self_loops(pl_graph):
    _, edges = pl_graph
    assert edges.filter("src = dst").count() == 0


def test_no_duplicate_edges(pl_graph):
    _, edges = pl_graph
    assert edges.count() == edges.distinct().count()


def test_node_count_and_feat_dim(pl_graph):
    nodes, _ = pl_graph
    assert nodes.count() == 400
    assert len(nodes.first()["feat"]) == 8


def test_edge_endpoints_in_range(pl_graph):
    _, edges = pl_graph
    assert edges.filter("src < 0 or src >= 400 or dst < 0 or dst >= 400").count() == 0


@pytest.mark.parametrize("skew,col", [("in", "dst"), ("out", "src")])
def test_skew_side_is_skewed(spark, skew, col):
    """The skewed endpoint's max degree should far exceed the uniform
    endpoint's max degree."""
    _, edges = power_law_graph(
        spark, n_nodes=2000, avg_degree=5, skew=skew, alpha=1.3, seed=3
    )
    pdf = edges.toPandas()
    skew_max = pdf[col].value_counts().iloc[0]
    other = "src" if col == "dst" else "dst"
    unif_max = pdf[other].value_counts().iloc[0]
    assert skew_max > 3 * unif_max


def test_unknown_skew_rejected(spark):
    with pytest.raises(ValueError):
        power_law_graph(spark, n_nodes=10, avg_degree=2, skew="sideways")


def test_uniform_graph_is_flat(spark):
    _, edges = uniform_graph(spark, n_nodes=2000, avg_degree=5, seed=3)
    vc = edges.toPandas()["dst"].value_counts()
    assert vc.iloc[0] < 30  # no hub under uniform sampling


def test_in_degrees_oracle(pl_graph):
    _, edges = pl_graph
    assert_equivalent(
        in_degrees(edges),
        "select dst as id, count(*) as in_deg from edges group by dst",
        edges=edges,
    )


def test_out_degrees_oracle(pl_graph):
    _, edges = pl_graph
    assert_equivalent(
        out_degrees(edges),
        "select src as id, count(*) as out_deg from edges group by src",
        edges=edges,
    )


def test_avg_degree_close_to_requested(spark):
    nodes, edges = power_law_graph(spark, n_nodes=1000, avg_degree=8, seed=0)
    avg = edges.count() / nodes.count()
    assert 6.0 <= avg <= 8.05  # dedup removes a little


# -- planted labels ---------------------------------------------------------


def test_planted_labels_deterministic():
    rng = np.random.default_rng(0)
    feat = rng.standard_normal((50, 4))
    src = rng.integers(0, 50, 200)
    dst = rng.integers(0, 50, 200)
    a = planted_labels(feat, src, dst, n_classes=4, seed=3)
    b = planted_labels(feat, src, dst, n_classes=4, seed=3)
    np.testing.assert_array_equal(a, b)


def test_planted_labels_depend_on_structure():
    rng = np.random.default_rng(0)
    feat = rng.standard_normal((200, 6))
    src = rng.integers(0, 200, 1500)
    dst = rng.integers(0, 200, 1500)
    y1 = planted_labels(feat, src, dst, n_classes=4, seed=3, noise=0.0)
    perm = rng.permutation(len(src))
    y2 = planted_labels(feat, src[perm], dst[perm], n_classes=4, seed=3, noise=0.0)
    np.testing.assert_array_equal(y1, y2)  # edge order irrelevant
    y3 = planted_labels(feat, dst, src, n_classes=4, seed=3, noise=0.0)
    assert (y1 != y3).mean() > 0.1  # direction matters -> structure matters


def test_planted_multilabel_balanced():
    rng = np.random.default_rng(0)
    feat = rng.standard_normal((300, 6))
    src = rng.integers(0, 300, 1000)
    dst = rng.integers(0, 300, 1000)
    y = planted_labels(feat, src, dst, n_classes=8, multilabel=True, seed=3)
    assert y.shape == (300, 8)
    rates = y.mean(axis=0)
    assert (rates > 0.3).all() and (rates < 0.7).all()


def test_planted_multiclass_uses_all_classes():
    rng = np.random.default_rng(0)
    feat = rng.standard_normal((500, 6))
    src = rng.integers(0, 500, 2000)
    dst = rng.integers(0, 500, 2000)
    y = planted_labels(feat, src, dst, n_classes=5, seed=3)
    assert set(np.unique(y)) == set(range(5))

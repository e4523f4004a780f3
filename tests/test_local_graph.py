"""LocalGraph: CSR index, k-hop sampling, Spark round-trip."""
import numpy as np
import pytest

from repro.graphs.local import LocalGraph

RNG = np.random.default_rng(3)


def make_graph(n=50, e=200, d=4):
    feat = RNG.standard_normal((n, d))
    src = RNG.integers(0, n, e)
    dst = RNG.integers(0, n, e)
    keep = src != dst
    return LocalGraph(feat=feat, src=src[keep], dst=dst[keep])


def test_basic_props():
    g = make_graph()
    assert g.n == 50 and g.dim == 4 and g.e == len(g.src)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_in_neighbors_matches_edge_list(seed):
    rng = np.random.default_rng(seed)
    n = 30
    src = rng.integers(0, n, 100)
    dst = rng.integers(0, n, 100)
    g = LocalGraph(feat=np.zeros((n, 2)), src=src, dst=dst)
    for v in range(n):
        expect = sorted(src[dst == v].tolist())
        assert sorted(g.in_neighbors(v).tolist()) == expect


def test_sample_khop_full_fanout_covers_exact_neighborhood():
    g = make_graph()
    rng = np.random.default_rng(0)
    targets = np.array([0, 1])
    node_ids, lsrc, ldst = g.sample_khop(targets, hops=1, fanout=10**6, rng=rng)
    # every in-edge of the targets present, nothing else
    got = {(node_ids[s], node_ids[d]) for s, d in zip(lsrc, ldst)}
    expect = {
        (s, d) for s, d in zip(g.src, g.dst) if d in targets.tolist()
    }
    assert got == expect


def test_sample_khop_respects_fanout():
    g = make_graph(n=20, e=400)
    rng = np.random.default_rng(0)
    node_ids, lsrc, ldst = g.sample_khop(np.array([0]), hops=1, fanout=3, rng=rng)
    assert len(lsrc) <= 3


def test_sample_khop_two_hops_superset_of_one():
    g = make_graph()
    n1, *_ = g.sample_khop(np.array([5]), hops=1, fanout=10**6, rng=np.random.default_rng(0))
    n2, *_ = g.sample_khop(np.array([5]), hops=2, fanout=10**6, rng=np.random.default_rng(0))
    assert set(n1.tolist()) <= set(n2.tolist())


def test_sample_khop_local_ids_valid():
    g = make_graph()
    node_ids, lsrc, ldst = g.sample_khop(
        np.arange(5), hops=2, fanout=4, rng=np.random.default_rng(1)
    )
    assert lsrc.max(initial=-1) < len(node_ids)
    assert ldst.max(initial=-1) < len(node_ids)


def test_mask_requires_split():
    g = make_graph()
    with pytest.raises(ValueError):
        g.mask("train")


def test_from_spark_roundtrip(spark):
    import pandas as pd

    n = 25
    feat = RNG.standard_normal((n, 3))
    nodes = spark.createDataFrame(
        pd.DataFrame(
            {
                "id": np.arange(n),
                "feat": feat.tolist(),
                "label": RNG.integers(0, 3, n),
                "split": ["train"] * 5 + ["test"] * (n - 5),
            }
        )
    )
    src = RNG.integers(0, n, 60)
    dst = RNG.integers(0, n, 60)
    edges = spark.createDataFrame(pd.DataFrame({"src": src, "dst": dst}))
    g = LocalGraph.from_spark(nodes, edges)
    np.testing.assert_allclose(g.feat, feat, atol=1e-12)
    assert g.mask("train").sum() == 5
    assert sorted(zip(g.src, g.dst)) == sorted(zip(src.tolist(), dst.tolist()))


def test_from_spark_rejects_noncontiguous_ids(spark):
    import pandas as pd

    nodes = spark.createDataFrame(
        pd.DataFrame({"id": [0, 2], "feat": [[1.0], [2.0]]})
    )
    edges = spark.createDataFrame(pd.DataFrame({"src": [0], "dst": [2]}))
    with pytest.raises(ValueError):
        LocalGraph.from_spark(nodes, edges)


def test_multilabel_labels_from_spark(spark):
    import pandas as pd

    nodes = spark.createDataFrame(
        pd.DataFrame(
            {
                "id": [0, 1],
                "feat": [[1.0], [2.0]],
                "labels": [[1, 0], [0, 1]],
            }
        )
    )
    edges = spark.createDataFrame(pd.DataFrame({"src": [0], "dst": [1]}))
    g = LocalGraph.from_spark(nodes, edges)
    assert g.labels.shape == (2, 2)

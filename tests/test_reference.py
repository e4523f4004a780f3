"""Layer-by-layer agreement: the MR backend's persisted round states are
exactly the reference's intermediate embeddings (the hierarchical,
layer-wise property of §IV-B2)."""
import numpy as np
import pytest

from repro.backends.mapreduce import infer_mr
from repro.core.model import build_gat, build_sage
from repro.core.reference import embeddings_per_layer, forward_full, predict_full
from repro.graphs.generators import power_law_graph
from repro.graphs.local import LocalGraph


@pytest.fixture(scope="module")
def graph(spark):
    nodes, edges = power_law_graph(
        spark, n_nodes=100, avg_degree=4, feat_dim=6, seed=19
    )
    return nodes, edges, LocalGraph.from_spark(nodes, edges)


@pytest.mark.parametrize("builder", [build_sage, build_gat])
def test_round_states_match_reference_layers(spark, graph, tmp_path, builder):
    nodes, edges, g = graph
    model = builder(6, 8, 3, n_layers=2, seed=9)
    infer_mr(spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8)
    ref_layers = embeddings_per_layer(model, g)
    for k in (1, 2):
        state = spark.read.parquet(str(tmp_path / "mr" / f"state_{k}.parquet"))
        pdf = state.toPandas().sort_values("id")
        got = np.stack(pdf["h"].to_numpy())
        np.testing.assert_allclose(
            got, ref_layers[k - 1][pdf["id"].to_numpy()], atol=1e-9
        )


def test_round_zero_state_is_raw_features(spark, graph, tmp_path):
    nodes, edges, g = graph
    model = build_sage(6, 8, 3, seed=9)
    infer_mr(spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8)
    state0 = spark.read.parquet(str(tmp_path / "mr" / "state_0.parquet"))
    pdf = state0.toPandas().sort_values("id")
    np.testing.assert_allclose(
        np.stack(pdf["h"].to_numpy()), g.feat[pdf["id"].to_numpy()], atol=1e-12
    )


def test_predict_full_consistent_with_forward(graph):
    _, _, g = graph
    model = build_sage(6, 8, 3, seed=9)
    np.testing.assert_array_equal(
        predict_full(model, g), model.predict(forward_full(model, g))
    )


def test_embeddings_per_layer_shapes(graph):
    _, _, g = graph
    model = build_gat(6, 8, 3, n_layers=3, seed=9)
    layers = embeddings_per_layer(model, g)
    assert [e.shape for e in layers] == [(g.n, 8)] * 3

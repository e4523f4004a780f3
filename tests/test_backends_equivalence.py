"""InferTurbo backends vs the local dense reference.

The paper's central correctness claim: full-graph GAS inference "never
changes the formula of GNNs or introduces any approximation", so both
backends — under every optimization-strategy combination — must produce
the same logits as a dense local forward, for both SAGE and GAT.
"""
import numpy as np
import pytest

from repro.backends.mapreduce import infer_mr
from repro.backends.pregel import infer_pregel
from repro.core.model import build_gat, build_sage
from repro.core.reference import forward_full
from repro.graphs.generators import power_law_graph
from repro.graphs.local import LocalGraph
from repro.strategies import StrategyConfig


@pytest.fixture(scope="module")
def graph(spark):
    nodes, edges = power_law_graph(
        spark, n_nodes=150, avg_degree=5, skew="both", alpha=1.2, feat_dim=6, seed=4
    )
    return nodes, edges, LocalGraph.from_spark(nodes, edges)


MODELS = {
    "sage": lambda: build_sage(6, 10, 4, seed=5),
    "sage_max": lambda: build_sage(6, 10, 4, agg="max", seed=5),
    "sage_sum": lambda: build_sage(6, 10, 4, agg="sum", seed=5),
    "gat": lambda: build_gat(6, 10, 4, heads=2, seed=5),
}

STRATS = {
    "none": StrategyConfig.none(),
    "pg": StrategyConfig(partial_gather=True),
    "bc": StrategyConfig(broadcast=True),
    "sn": StrategyConfig(shadow_nodes=True, shadow_lambda=0.05),
    "all": StrategyConfig(True, True, True, 0.05),
}


def _check(result, ref, atol=1e-8):
    pdf = result.toPandas().sort_values("id")
    got = np.stack(pdf["logits"].to_numpy())
    np.testing.assert_allclose(got, ref[pdf["id"].to_numpy()], atol=atol)
    assert len(pdf) == ref.shape[0]


@pytest.mark.parametrize("model_key", list(MODELS))
def test_mr_matches_reference(spark, graph, tmp_path, model_key):
    nodes, edges, g = graph
    model = MODELS[model_key]()
    ref = forward_full(model, g)
    result, _ = infer_mr(
        spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8
    )
    _check(result, ref)


@pytest.mark.parametrize("model_key", list(MODELS))
def test_pregel_matches_reference(spark, graph, model_key):
    nodes, edges, g = graph
    model = MODELS[model_key]()
    ref = forward_full(model, g)
    result, _ = infer_pregel(spark, nodes, edges, model)
    _check(result, ref)


@pytest.mark.parametrize("strat_key", [k for k in STRATS if k != "none"])
def test_mr_strategies_preserve_results_sage(spark, graph, tmp_path, strat_key):
    nodes, edges, g = graph
    model = MODELS["sage"]()
    ref = forward_full(model, g)
    result, _ = infer_mr(
        spark,
        nodes,
        edges,
        model,
        workdir=tmp_path / "mr",
        strategies=STRATS[strat_key],
        n_buckets=8,
    )
    _check(result, ref)


@pytest.mark.parametrize("strat_key", [k for k in STRATS if k != "none"])
def test_pregel_strategies_preserve_results_sage(spark, graph, strat_key):
    nodes, edges, g = graph
    model = MODELS["sage"]()
    ref = forward_full(model, g)
    result, _ = infer_pregel(spark, nodes, edges, model, strategies=STRATS[strat_key])
    _check(result, ref)


@pytest.mark.parametrize("strat_key", ["pg", "all"])
def test_gat_ignores_partial_gather_safely(spark, graph, tmp_path, strat_key):
    """Partial-gather is illegal for GAT (union aggregate); enabling the
    strategy must silently fall back, not corrupt results."""
    nodes, edges, g = graph
    model = MODELS["gat"]()
    ref = forward_full(model, g)
    result, _ = infer_mr(
        spark,
        nodes,
        edges,
        model,
        workdir=tmp_path / "mr",
        strategies=STRATS[strat_key],
        n_buckets=8,
    )
    _check(result, ref)


def test_mr_and_pregel_bit_identical(spark, graph, tmp_path):
    """The two backends implement the same abstraction: same bits out."""
    nodes, edges, g = graph
    model = MODELS["sage"]()
    a, _ = infer_mr(spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8)
    b, _ = infer_pregel(spark, nodes, edges, model)
    pa = a.toPandas().sort_values("id").reset_index(drop=True)
    pb = b.toPandas().sort_values("id").reset_index(drop=True)
    np.testing.assert_allclose(
        np.stack(pa["logits"].to_numpy()), np.stack(pb["logits"].to_numpy()), atol=1e-12
    )
    assert (pa["pred"].to_numpy() == pb["pred"].to_numpy()).all()


def test_predictions_match_logits(spark, graph, tmp_path):
    nodes, edges, g = graph
    model = MODELS["sage"]()
    result, _ = infer_mr(spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8)
    pdf = result.toPandas()
    np.testing.assert_array_equal(
        pdf["pred"].to_numpy(), np.stack(pdf["logits"].to_numpy()).argmax(1)
    )


def test_multilabel_predictions(spark, graph, tmp_path):
    nodes, edges, g = graph
    model = build_sage(6, 10, 4, task="multilabel", seed=5)
    result, _ = infer_mr(spark, nodes, edges, model, workdir=tmp_path / "mr", n_buckets=8)
    pdf = result.toPandas()
    logits = np.stack(pdf["logits"].to_numpy())
    preds = np.stack(pdf["pred"].to_numpy())
    np.testing.assert_array_equal(preds, (logits > 0).astype("int64"))


@pytest.mark.parametrize("n_layers", [1, 3])
def test_layer_count_respected(spark, graph, tmp_path, n_layers):
    nodes, edges, g = graph
    model = build_sage(6, 10, 4, n_layers=n_layers, seed=5)
    ref = forward_full(model, g)
    result, stats = infer_mr(
        spark,
        nodes,
        edges,
        model,
        workdir=tmp_path / "mr",
        n_buckets=8,
        instrument=True,
    )
    _check(result, ref)
    assert len(stats.rounds) == n_layers

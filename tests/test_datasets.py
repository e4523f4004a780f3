"""Lite dataset stand-ins: splits, label columns, Table-I metadata."""
import numpy as np
import pytest

from repro.graphs import datasets
from repro.graphs.stats import summarize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def ppi(spark):
    return datasets.load(spark, "ppi_lite", scale=0.3, seed=1)


@pytest.fixture(scope="module")
def products(spark):
    return datasets.load(spark, "products_lite", scale=0.1, seed=1)


def test_ppi_is_multilabel(ppi):
    nodes, _, meta = ppi
    assert meta.multilabel
    assert "labels" in nodes.columns and "label" not in nodes.columns
    assert len(nodes.first()["labels"]) == meta.n_classes


def test_products_is_multiclass(products):
    nodes, _, meta = products
    assert not meta.multilabel
    assert "label" in nodes.columns
    n_classes = nodes.selectExpr("count(distinct label) as c").first()["c"]
    assert n_classes <= meta.n_classes


def test_split_proportions(products):
    nodes, _, _ = products
    counts = {r["split"]: r["c"] for r in nodes.groupBy("split").count().withColumnRenamed("count", "c").collect()}
    n = sum(counts.values())
    assert counts["train"] == n // 10
    assert counts["val"] == n // 10
    assert counts["test"] == n - 2 * (n // 10)


def test_split_counts_oracle(products):
    nodes, _, _ = products
    from pyspark.sql import functions as F

    got = nodes.groupBy("split").agg(F.count("*").alias("cnt"))
    assert_equivalent(
        got,
        "select split, count(*) as cnt from nodes group by split",
        nodes=nodes.select("id", "split"),
    )


def test_scale_parameter(spark):
    n_small = datasets.load(spark, "mag_lite", scale=0.05, seed=1)[0].count()
    n_big = datasets.load(spark, "mag_lite", scale=0.1, seed=1)[0].count()
    assert n_small < n_big


def test_deterministic(spark):
    a = datasets.load(spark, "ppi_lite", scale=0.2, seed=4)[1].toPandas()
    b = datasets.load(spark, "ppi_lite", scale=0.2, seed=4)[1].toPandas()
    assert a.equals(b)


@pytest.mark.parametrize("name", list(datasets.ALL_METAS))
def test_all_datasets_load_and_summarize(spark, name):
    nodes, edges, meta = datasets.load(spark, name, scale=0.05, seed=1)
    s = summarize(nodes, edges)
    assert s["n_nodes"] == nodes.count()
    assert s["feat_dim"] == meta.feat_dim
    assert s["n_classes"] <= meta.n_classes
    assert s["avg_degree"] > 1


def test_meta_mirrors_paper_table1():
    """Our Table-I rows must record the paper's original numbers."""
    m = datasets.PPI_LITE
    assert (m.paper_nodes, m.paper_edges, m.paper_feat, m.paper_classes) == (
        56944,
        818716,
        50,
        121,
    )
    assert datasets.MAG_LITE.paper_classes == 153
    assert datasets.PRODUCTS_LITE.paper_classes == 47

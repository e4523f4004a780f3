"""Smoke tests: every table harness runs end-to-end at tiny scale and
produces rows with the expected shape properties."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import strategy_analysis  # noqa: E402
import table1_datasets  # noqa: E402
import table2_performance  # noqa: E402
import table3_efficiency  # noqa: E402
import table4_hops  # noqa: E402


def test_table1(spark):
    rows = table1_datasets.run(spark, scale=0.05, pl_nodes=500)
    assert len(rows) == 4
    names = {r["dataset"] for r in rows}
    assert names == {"ppi_lite", "products_lite", "mag_lite", "power_law"}
    for r in rows:
        assert r["#Edge"] > r["#Node"]
        assert r["paper #Node"] >= r["#Node"]


@pytest.mark.slow
def test_table2(spark):
    rows = table2_performance.run(spark, scale=0.12, epochs=4, hidden=12, fanout_infer=10)
    assert len(rows) == 6
    for r in rows:
        # all three inference modes produced sane scores
        for col in ("PyG-like", "DGL-like", "Ours"):
            assert 0.0 <= r[col] <= 1.0


def test_table3(spark):
    rows = table3_efficiency.run(spark, n_nodes=400, avg_degree=6, feat_dim=8, hidden=8, fanout=5)
    assert len(rows) == 2
    for r in rows:
        assert r["khop (s)"] > 0 and r["On-MR (s)"] > 0 and r["On-Pregel (s)"] > 0


def test_table4(spark):
    rows = table4_hops.run(
        spark,
        n_nodes=250,
        avg_degree=6,
        feat_dim=8,
        hidden=8,
        nbr_small=3,
        nbr_large=50,
        row_budget=3000,
    )
    assert [r["hops"] for r in rows] == [1, 2, 3]
    # InferTurbo's message volume is linear in hops: rows_k = k * E
    ours = [r["ours rows"] for r in rows]
    assert ours[1] == 2 * ours[0] and ours[2] == 3 * ours[0]
    # the near-unsampled baseline must hit the budget by hop 3
    assert rows[2]["nbr50 (s)"] == "OOM"


def test_strategy_analysis(spark):
    rows = strategy_analysis.run(spark, n_nodes=2000, avg_degree=10)
    assert [r["strategy"].split(" ")[0] for r in rows] == [
        "partial-gather",
        "broadcast",
        "shadow-nodes",
    ]
    # every strategy must reduce the tail-worker IO
    for r in rows:
        assert float(r["tail-10% reduction"].rstrip("%")) > 0

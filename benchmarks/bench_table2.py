"""Table II benchmark: prediction quality — sampled baselines vs
InferTurbo full-graph inference of the same trained models.

Shape to reproduce: all three inference columns comparable per row
(the paper's deltas are ≤0.01); InferTurbo never *loses* accuracy
because it computes the exact unsampled forward.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import table2_performance  # noqa: E402


def test_bench_table2(spark, benchmark, save_rows):
    rows = benchmark.pedantic(
        lambda: table2_performance.run(spark, scale=1.0, epochs=14, hidden=24),
        rounds=1,
        iterations=1,
    )
    save_rows("table2", rows)
    assert len(rows) == 6
    for r in rows:
        # models actually learned: >= 2x chance (12-16 classes -> 6-8%)
        assert r["Ours"] > 0.16
        # full-graph inference comparable to the sampled baselines —
        # the paper's actual Table II claim
        base = max(r["PyG-like"], r["DGL-like"])
        assert r["Ours"] >= base - 0.05

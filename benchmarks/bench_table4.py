"""Table IV benchmark: cost vs hops.

Shape to reproduce: the baseline's cost explodes with hop count and the
near-unsampled variant OOMs (row budget) at 3 hops, while InferTurbo's
message volume and time grow linearly in the number of layers.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import table4_hops  # noqa: E402


def test_bench_table4(spark, benchmark, save_rows):
    rows = benchmark.pedantic(
        lambda: table4_hops.run(
            spark,
            n_nodes=4000,
            avg_degree=15,
            nbr_small=10,
            nbr_large=100,
            row_budget=6_000_000,
        ),
        rounds=1,
        iterations=1,
    )
    save_rows("table4", rows)
    assert [r["hops"] for r in rows] == [1, 2, 3]

    # baseline (sampled) neighborhoods grow super-linearly in hops
    small = [r["nbr10 rows"] for r in rows]
    assert small[2] - small[1] > 2 * (small[1] - small[0])
    # near-unsampled baseline hits the memory budget at hop 3 (paper: OOM)
    assert rows[2]["nbr100 (s)"] == "OOM"
    # InferTurbo is exactly linear in hops: k * |E| messages
    ours = [r["ours rows"] for r in rows]
    assert ours[1] == 2 * ours[0] and ours[2] == 3 * ours[0]
    # and its wall time stays sub-exponential (hop3 < 3x hop1 + overhead)
    assert rows[2]["ours (s)"] < 6 * rows[0]["ours (s)"] + 30

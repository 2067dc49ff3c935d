"""§7.4 (Figure 9) — L2P vs PAR-G / PAR-C / PAR-D / PAR-A."""
from benchmarks._util import run_once

from repro.experiments import exp_partitioning


def test_fig9_partitioning(benchmark):
    df = run_once(benchmark, exp_partitioning.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    r = df.set_index("method")
    # headline shapes: L2P builds far faster than the slowest algorithmic
    # method (PAR-A here; PAR-G's graph cost only explodes at full scale,
    # see EXPERIMENTS.md) and keeps the smallest resident state
    assert r.loc["L2P", "partition_seconds"] < r.loc["PAR-A", "partition_seconds"]
    # constant resident state beats every whole-dataset method; PAR-G's
    # kNN graph (n_edges ∝ k|D|) overtakes L2P's constant just above
    # this |D|, see EXPERIMENTS.md
    for other in ("PAR-C", "PAR-D", "PAR-A"):
        assert r.loc["L2P", "space_items"] < r.loc[other, "space_items"]
    # and L2P search time is at worst competitive with every heuristic
    assert r.loc["L2P", "knn_ms"] <= 1.5 * r["knn_ms"].min()

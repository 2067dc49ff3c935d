"""§7.6 (Figure 13) — disk-based engine comparison via the I/O model."""
from benchmarks._util import run_once

from repro.experiments import exp_baselines_disk


def test_fig13_disk_baselines(benchmark):
    df = run_once(benchmark, exp_baselines_disk.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    # headline shapes: on simulated disk time LES3 crushes the
    # random-probe indexes, beats brute force at the selective end, and
    # brute force overtakes DualTrans/InvIdx over a wide sweep range
    mean_total = df.groupby("engine")["total_ms"].mean()
    assert mean_total["LES3"] < mean_total["DualTrans"]
    assert mean_total["LES3"] < mean_total["InvIdx"]
    piv = df.pivot_table(index=["dataset", "query", "param"], columns="engine",
                         values="total_ms").reset_index()
    # selective-end win over brute force on the large-set dataset (fs);
    # pmc's full scan is only ~2 MB at this scale, so brute stays cheap
    # there — see EXPERIMENTS.md
    sel = piv[(piv["dataset"] == "fs")
              & (((piv["query"] == "range") & (piv["param"] >= 0.9))
                 | ((piv["query"] == "knn") & (piv["param"] <= 1)))]
    assert (sel["LES3"] < sel["Brute"]).all()
    assert ((piv["Brute"] < piv["InvIdx"]) | (piv["Brute"] < piv["DualTrans"])).any()

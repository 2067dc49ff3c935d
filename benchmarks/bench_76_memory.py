"""§7.6 (Figure 12) — memory-based engine comparison."""
from benchmarks._util import run_once

from repro.experiments import exp_baselines_memory


def test_fig12_memory_baselines(benchmark):
    df = run_once(benchmark, exp_baselines_memory.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    # verified shapes (see EXPERIMENTS.md for the InvIdx-at-small-scale
    # deviation): LES3 prunes on every sweep point, beats DualTrans
    # everywhere on time, and beats brute force on selective range sweeps
    cand = df.pivot_table(index=["dataset", "query", "param"], columns="engine",
                          values="mean_candidates")
    assert (cand["LES3"] < cand["Brute"]).all()
    ms = df.pivot_table(index=["dataset", "query", "param"], columns="engine",
                        values="ms")
    assert ms["LES3"].mean() < ms["DualTrans"].mean()
    # clear wall-clock wins over brute force where verification volume
    # dominates (livej's large sets); on the small-set datasets the win
    # is in candidates only at this |D| — see EXPERIMENTS.md
    sel = ms.reset_index()
    hi = sel[(sel["dataset"] == "livej")
             & (((sel["query"] == "range") & (sel["param"] >= 0.7))
                | ((sel["query"] == "knn") & (sel["param"] <= 1)))]
    assert (hi["LES3"] < hi["Brute"]).all()

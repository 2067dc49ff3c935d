"""§7.5 (Figure 10) — sensitivity to n and k."""
from benchmarks._util import run_once

from repro.experiments import exp_sensitivity


def test_fig10_sensitivity(benchmark):
    df = run_once(benchmark, exp_sensitivity.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    # Figure 10 shapes: more groups -> fewer candidates (monotone-ish);
    # larger k -> more candidates at fixed n
    k10 = df[df["k"] == 10].sort_values("n_groups")
    assert k10["mean_candidates"].iloc[-1] < k10["mean_candidates"].iloc[0]
    nmax = df[df["n_groups"] == df["n_groups"].max()].sort_values("k")
    assert nmax["mean_candidates"].iloc[-1] >= nmax["mean_candidates"].iloc[0]

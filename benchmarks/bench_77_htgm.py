"""§7.7 (Figure 14) — TGM vs HTGM cost ratios across alpha."""
from benchmarks._util import run_once

from repro.experiments import exp_htgm


def test_fig14_htgm(benchmark):
    df = run_once(benchmark, exp_htgm.run, n_sets=2500, n_tokens=2500, n_queries=30)
    benchmark.extra_info["table"] = df.to_dict("records")
    df = df.sort_values("alpha")
    # headline: HTGM pays off (access ratio < 1) when most sets are
    # dissimilar (large alpha) and is overhead at small alpha
    assert df["access_ratio"].iloc[-1] < 1.0
    assert df["access_ratio"].iloc[0] > 1.0
    assert df["access_ratio"].iloc[-1] < df["access_ratio"].iloc[0]

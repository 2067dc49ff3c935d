"""§7.8 (Figure 15) — PE degradation under insertions."""
from benchmarks._util import run_once

from repro.experiments import exp_updates


def test_fig15_updates(benchmark):
    df = run_once(benchmark, exp_updates.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    # headline shapes: the PE drop vs re-build grows with the insertion
    # ratio but stays bounded (paper: <=8% at full scale; more slack at
    # 1/300 scale where partitioning variance is larger)
    assert df["pe_drop_pct"].max() < 40.0
    for _, sub in df.groupby("universe"):
        sub = sub.sort_values("ratio")
        assert sub["pe_drop_pct"].iloc[-1] > sub["pe_drop_pct"].iloc[0]

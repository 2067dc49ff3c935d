"""§7.6 (Figure 11) — index size and construction time."""
from benchmarks._util import run_once

from repro.experiments import exp_index_cost


def test_fig11_index_cost(benchmark):
    df = run_once(benchmark, exp_index_cost.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    # headline: TGM is the smallest index on every dataset (paper: ~90% less)
    assert (df["les3_bytes"] < df["dualtrans_bytes"]).all()
    assert (df["les3_bytes"] < df["invidx_bytes"]).all()

"""§7.3 (Figure 8) — PTR vs representation baselines."""
from benchmarks._util import run_once

from repro.experiments import exp_representation


def test_fig8_representation(benchmark):
    df = run_once(benchmark, exp_representation.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    r = df.set_index("method")
    # headline shapes: PTR embeds orders of magnitude faster than PCA/MDS
    assert r.loc["pca", "embed_seconds"] > 5 * r.loc["ptr", "embed_seconds"]
    assert r.loc["mds", "embed_seconds"] > 100 * r.loc["ptr", "embed_seconds"]
    # and PTR prunes better than the token-oblivious Binary Encoding
    assert r.loc["ptr", "knn_pe"] > r.loc["binary", "knn_pe"]

"""§7.2 (Figure 7) — L2P convergence and training cost."""
from benchmarks._util import run_once

from repro.experiments import exp_training


def test_fig7a_learning_curves(benchmark):
    df = run_once(benchmark, exp_training.learning_curves)
    benchmark.extra_info["table"] = df.to_dict("records")
    # Figure 7a: loss decreases and converges within ~2 epochs
    for name, sub in df.groupby("dataset"):
        losses = sub.sort_values("epoch")["loss"].tolist()
        assert losses[-1] <= losses[0]


def test_fig7b_training_cost(benchmark):
    df = run_once(benchmark, exp_training.training_cost)
    benchmark.extra_info["table"] = df.to_dict("records")
    # Figure 7b: cost grows with the number of groups (roughly linearly)
    df = df.sort_values("n_groups")
    assert df["train_seconds"].iloc[-1] > df["train_seconds"].iloc[0]

"""§7.2 (Figure 7) — L2P convergence and training cost."""
from _common import emit, parse_args

from repro.experiments import exp_training


def main():
    args = parse_args(__doc__)
    out = exp_training.run(seed=args.seed)
    emit("fig7a_learning_curves", out["curves"], args.out)
    emit("fig7b_training_cost", out["cost"], args.out)


if __name__ == "__main__":
    main()

"""§7.8 (Figure 15) — pruning-efficiency drop under insertions."""
from _common import emit, parse_args

from repro.experiments import exp_updates


def main():
    args = parse_args(__doc__)
    emit("fig15_updates", exp_updates.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

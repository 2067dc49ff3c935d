"""§7.6 (Figure 11) — index size and construction time."""
from _common import emit, parse_args

from repro.experiments import exp_index_cost


def main():
    args = parse_args(__doc__)
    emit("fig11_index_cost", exp_index_cost.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

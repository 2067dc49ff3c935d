"""§7.5 (Figure 10) — sensitivity to number of groups and k."""
from _common import emit, parse_args

from repro.experiments import exp_sensitivity


def main():
    args = parse_args(__doc__)
    emit("fig10_sensitivity", exp_sensitivity.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

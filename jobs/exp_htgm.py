"""§7.7 (Figure 14) — TGM vs HTGM across similarity distributions."""
from _common import emit, parse_args

from repro.experiments import exp_htgm


def main():
    args = parse_args(__doc__)
    emit("fig14_htgm", exp_htgm.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

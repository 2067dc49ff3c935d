"""§7.4 (Figure 9) — L2P vs PAR-G / PAR-C / PAR-D / PAR-A."""
from _common import emit, parse_args

from repro.experiments import exp_partitioning


def main():
    args = parse_args(__doc__)
    emit("fig9_partitioning", exp_partitioning.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

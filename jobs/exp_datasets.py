"""Table 2 — dataset statistics of the scaled synthetic stand-ins."""
from _common import emit, parse_args

from repro.experiments import exp_datasets


def main():
    args = parse_args(__doc__)
    emit("t2_datasets", exp_datasets.run(seed=args.seed or 7), args.out)


if __name__ == "__main__":
    main()

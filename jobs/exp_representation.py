"""§7.3 (Figure 8) — PTR vs PCA / MDS / Binary Encoding / PTR-half."""
from _common import emit, parse_args

from repro.experiments import exp_representation


def main():
    args = parse_args(__doc__)
    emit("fig8_representation", exp_representation.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

"""§7.6 (Figure 13) — disk-based engine comparison (I/O cost model)."""
from _common import emit, parse_args

from repro.experiments import exp_baselines_disk


def main():
    args = parse_args(__doc__)
    emit("fig13_disk", exp_baselines_disk.run(seed=args.seed), args.out)


if __name__ == "__main__":
    main()

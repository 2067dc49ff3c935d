"""Table 2 — generator statistics for every dataset stand-in."""
from benchmarks._util import run_once

from repro.experiments import exp_datasets


def test_t2_dataset_stats(benchmark):
    df = run_once(benchmark, exp_datasets.run)
    benchmark.extra_info["table"] = df.to_dict("records")
    assert len(df) == 6

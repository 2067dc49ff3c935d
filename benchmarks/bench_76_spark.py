"""§7.6 (Figure 12, distributed) — Spark batch engines end-to-end."""
from benchmarks._util import run_once

from repro.experiments import exp_baselines_memory


def test_fig12_spark_batch(benchmark, spark):
    df = run_once(benchmark, exp_baselines_memory.run_spark, spark=spark)
    benchmark.extra_info["table"] = df.to_dict("records")
    assert len(df) == 6

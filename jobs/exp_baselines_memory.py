"""§7.6 (Figure 12) — memory-based engine comparison.

Includes the distributed Spark batch comparison (SparkLES3 vs
SparkInvIdx vs SparkBrute), the centerpiece distributed dataflow.
"""
from _common import emit, get_spark, parse_args

from repro.experiments import exp_baselines_memory


def main():
    args = parse_args(__doc__)
    emit("fig12_memory", exp_baselines_memory.run(seed=args.seed), args.out)
    spark = get_spark()
    try:
        emit(
            "fig12_spark_batch",
            exp_baselines_memory.run_spark(spark, seed=args.seed),
            args.out,
        )
    finally:
        spark.stop()


if __name__ == "__main__":
    main()

"""Smoke tests: every experiment harness runs at tiny scale and emits
the columns EXPERIMENTS.md documents."""
import pandas as pd
import pytest

from repro.experiments import (
    exp_baselines_disk,
    exp_baselines_memory,
    exp_datasets,
    exp_htgm,
    exp_index_cost,
    exp_partitioning,
    exp_representation,
    exp_sensitivity,
    exp_training,
    exp_updates,
)


def cols(df: pd.DataFrame, *names):
    assert set(names) <= set(df.columns), df.columns
    assert len(df) > 0


def test_t2_datasets():
    df = exp_datasets.run(scales={"kosarak": 0.0002, "aol": 0.00002})
    cols(df, "dataset", "paper_n_sets", "gen_n_sets", "gen_avg_size")
    assert set(df["dataset"]) == {"kosarak", "aol"}


def test_72_learning_curves():
    df = exp_training.learning_curves(scale=0.0001, epochs=2, n_pairs=400)
    cols(df, "dataset", "epoch", "loss")
    assert df["epoch"].max() == 2


def test_72_training_cost():
    df = exp_training.training_cost(scale=0.0004, group_counts=(4, 8))
    cols(df, "n_groups", "train_seconds", "n_models")
    assert df["train_seconds"].min() >= 0


def test_73_representation():
    df = exp_representation.run(
        scale=0.0002, token_scale=0.004, n_groups=8, n_queries=5
    )
    cols(df, "method", "embed_seconds", "knn_ms", "range_ms", "knn_pe")
    assert set(df["method"]) == set(exp_representation.METHODS)


def test_74_partitioning():
    df = exp_partitioning.run(scale=0.0002, n_groups=4, n_queries=5)
    cols(df, "method", "partition_seconds", "space_items", "gpo", "knn_ms")
    assert set(df["method"]) == {"L2P", "PAR-G", "PAR-C", "PAR-D", "PAR-A"}


def test_75_sensitivity():
    df = exp_sensitivity.run(
        scale=0.0004, group_counts=(4, 8), ks=(1, 5), n_queries=5
    )
    cols(df, "n_groups", "k", "knn_ms", "pe")
    assert len(df) == 4


def test_76_index_cost():
    df = exp_index_cost.run(scale=0.0002, n_groups=4)
    cols(df, "dataset", "les3_bytes", "dualtrans_bytes", "invidx_bytes")
    # the headline claim: TGM is the smallest index everywhere
    assert (df["les3_bytes"] < df["dualtrans_bytes"]).all()
    assert (df["les3_bytes"] < df["invidx_bytes"]).all()


def test_76_memory_baselines():
    df = exp_baselines_memory.run(
        datasets=("kosarak",), scale=0.0002, n_groups=4,
        n_queries=5, deltas=(0.7,), ks=(5,),
    )
    cols(df, "dataset", "engine", "query", "param", "ms")
    assert set(df["engine"]) == {"LES3", "DualTrans", "InvIdx", "Brute"}


def test_76_disk_baselines():
    df = exp_baselines_disk.run(
        datasets=("fs",), scales={"fs": 0.00001}, n_groups=4,
        n_queries=5, deltas=(0.7,), ks=(5,),
    )
    cols(df, "engine", "io_ms", "cpu_ms", "total_ms")


def test_77_htgm():
    df = exp_htgm.run(
        alphas=(1.0, 4.0), n_sets=400, n_tokens=400,
        coarse_groups=4, fine_groups=16, n_queries=5,
    )
    cols(df, "alpha", "access_ratio", "sim_ratio")
    assert len(df) == 2


def test_78_updates():
    df = exp_updates.run(scale=0.0003, n_groups=4, ratios=(0.0, 0.5), n_queries=5)
    cols(df, "universe", "ratio", "pe_incremental", "pe_rebuild", "pe_drop_pct")
    assert set(df["universe"]) == {"closed", "open"}
    # smoke-scale PE (~0.03) is too noisy for drop-magnitude checks (the
    # benchmark asserts those at real scale); check structure only
    assert df["pe_incremental"].between(0, 1).all()
    assert df["pe_rebuild"].between(0, 1).all()


def test_76_spark_baselines(spark):
    df = exp_baselines_memory.run_spark(
        spark, scale=0.0003, n_groups=4, n_queries=4
    )
    cols(df, "engine", "query", "batch_seconds")
    assert len(df) == 6

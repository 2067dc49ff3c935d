"""Distributed baseline engines must agree with the local references."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.baselines.brute import LocalBrute, SparkBrute
from repro.baselines.invidx import LocalInvIdx, SparkInvIdx


@pytest.fixture(scope="module")
def db():
    return sd.gen_sets(n_sets=300, n_tokens=250, avg_size=7, seed=20)


@pytest.fixture(scope="module")
def data(spark, db):
    d = sd.sets_df(spark, db).cache()
    d.count()
    return d


@pytest.fixture(scope="module")
def queries(db):
    return sd.sample_queries(db, n=6, seed=21)


class TestSparkBrute:
    @pytest.mark.parametrize("delta", [0.8, 0.5])
    def test_range_matches_local(self, spark, db, data, queries, delta):
        out = SparkBrute(spark, data).range_batch(queries, delta)
        local = LocalBrute(db.sets)
        for qid, q in enumerate(queries):
            got = sorted(out.loc[out["qid"] == qid, "sid"].tolist())
            exp = sorted(i for i, _ in local.range(q, delta)[0])
            assert got == exp

    def test_knn_matches_local(self, spark, db, data, queries):
        out = SparkBrute(spark, data).knn_batch(queries, 5)
        local = LocalBrute(db.sets)
        for qid, q in enumerate(queries):
            got = sorted(out.loc[out["qid"] == qid, "sim"].tolist())
            exp = sorted(v for _, v in local.knn(q, 5)[0])
            np.testing.assert_allclose(got, exp, atol=1e-12)


class TestSparkInvIdx:
    @pytest.fixture(scope="class")
    def engine(self, spark, data, db):
        return SparkInvIdx(spark, data, db.n_tokens)

    @pytest.mark.parametrize("delta", [0.8, 0.5])
    def test_range_matches_local(self, db, engine, queries, delta):
        out = engine.range_batch(queries, delta)
        local = LocalInvIdx(db.sets, db.n_tokens)
        for qid, q in enumerate(queries):
            got = sorted(out.loc[out["qid"] == qid, "sid"].tolist())
            exp = sorted(i for i, _ in local.range(q, delta)[0])
            assert got == exp

    def test_knn_delta_descent_matches_brute(self, db, engine, queries):
        out = engine.knn_batch(queries, 5, z=0.2)
        brute = LocalBrute(db.sets)
        for qid, q in enumerate(queries):
            got = sorted(out.loc[out["qid"] == qid, "sim"].tolist())[-5:]
            exp = sorted(v for _, v in brute.knn(q, 5)[0])
            np.testing.assert_allclose(got, exp, atol=1e-12)

"""PCA / MDS embedding substrates for the §7.3 comparison."""
import numpy as np
import pytest

from repro.embeddings.classic import distance_matrix, mds_embed, one_hot, pca_embed
from repro.core.similarity import jaccard
from repro.synth_data import gen_sets


@pytest.fixture(scope="module")
def db():
    return gen_sets(n_sets=80, n_tokens=60, avg_size=6, seed=10)


class TestOneHot:
    def test_shape_and_content(self, db):
        m = one_hot(db.sets, db.n_tokens)
        assert m.shape == (80, 60)
        for i in (0, 5, 17):
            assert set(np.flatnonzero(m[i])) == set(db.sets[i].tolist())


class TestPCA:
    def test_shape(self, db):
        assert pca_embed(db.sets, db.n_tokens, 8).shape == (80, 8)

    def test_top_component_captures_most_variance(self):
        """A rank-1-ish token pattern must be captured by one component."""
        sets = [np.array([0, 1, 2])] * 20 + [np.array([10, 11, 12])] * 20
        emb = pca_embed(sets, 20, 2)
        # first axis separates the two blocks perfectly
        a, b = emb[:20, 0], emb[20:, 0]
        assert (a.max() < b.min()) or (b.max() < a.min())

    def test_components_orthogonal_projection_preserves_distances_rank(self, db):
        emb = pca_embed(db.sets, db.n_tokens, db.n_tokens)
        x = one_hot(db.sets, db.n_tokens)
        x -= x.mean(axis=0)
        # full-rank PCA is a rotation: pairwise L2 distances preserved
        d_orig = np.linalg.norm(x[0] - x[1])
        d_emb = np.linalg.norm(emb[0] - emb[1])
        assert d_emb == pytest.approx(d_orig, rel=1e-8)


class TestMDS:
    def test_distance_matrix_symmetric_zero_diag(self, db):
        dm = distance_matrix(db.sets[:30])
        np.testing.assert_allclose(dm, dm.T)
        np.testing.assert_allclose(np.diag(dm), 0.0)
        assert dm[0, 1] == pytest.approx(1.0 - jaccard(db.sets[0], db.sets[1]))

    def test_recovers_euclidean_configuration(self):
        """Classical MDS on distances of collinear points recovers the
        line up to rigid motion."""
        from repro.embeddings import classic

        pts = np.array([[0.0], [1.0], [3.0], [6.0]])
        dm = np.abs(pts - pts.T)
        n = len(dm)
        j = np.eye(n) - np.ones((n, n)) / n
        b = -0.5 * j @ (dm**2) @ j
        w, v = np.linalg.eigh(b)
        emb = v[:, [-1]] * np.sqrt(max(w[-1], 0))
        got = np.abs(emb - emb.T)
        np.testing.assert_allclose(got, dm, atol=1e-8)

    def test_embedding_shape_and_separation(self):
        sets = [np.array([0, 1, 2])] * 10 + [np.array([10, 11, 12])] * 10
        emb = mds_embed(sets, 2)
        assert emb.shape == (20, 2)
        a, b = emb[:10, 0], emb[10:, 0]
        assert (a.max() < b.min()) or (b.max() < a.min())

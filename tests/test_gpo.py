"""Partitioning objectives and the §4 theory checks."""
import numpy as np
import pytest

from repro.core import gpo
from repro.core.similarity import jaccard
from repro.synth_data import gen_sets


def uniform_db(n_sets=60, n_tokens=40, p=0.2, seed=0):
    """A database satisfying the uniform token distribution assumption
    (Definition 4.1): every token independently in every set w.p. p."""
    rng = np.random.default_rng(seed)
    return [
        np.flatnonzero(rng.random(n_tokens) < p).astype(np.int64)
        for _ in range(n_sets)
    ]


class TestObjectives:
    def test_u_value_single_group_is_token_count(self):
        sets = [np.array([0, 1]), np.array([1, 2]), np.array([3])]
        assert gpo.u_value(sets, np.zeros(3, dtype=int)) == 4

    def test_u_value_split(self):
        sets = [np.array([0, 1]), np.array([1, 2]), np.array([3])]
        groups = np.array([0, 0, 1])
        assert gpo.u_value(sets, groups) == 3 + 1

    def test_gpo_exact_small(self):
        sets = [np.array([0, 1]), np.array([0, 1]), np.array([2])]
        groups = np.array([0, 0, 0])
        # ordered pairs: (0,1),(1,0) dist 0; pairs with set 2: dist 1 × 4
        assert gpo.gpo(sets, groups) == pytest.approx(4.0)

    def test_gpo_singletons_are_zero(self):
        sets = [np.array([0]), np.array([1])]
        assert gpo.gpo(sets, np.array([0, 1])) == 0.0

    def test_gpo_equals_matrix_form(self):
        """Equation (14)'s masked-distance objective equals GPO."""
        rng = np.random.default_rng(1)
        sets = [np.unique(rng.integers(0, 20, 6)) for _ in range(12)]
        groups = rng.integers(0, 3, 12)
        n = len(sets)
        dist = np.zeros((n, n))
        for i in range(n):
            for j in range(n):
                if i != j:
                    dist[i, j] = 1.0 - jaccard(sets[i], sets[j])
        assert gpo.gpo_matrix_form(dist, groups) == pytest.approx(
            gpo.gpo(sets, groups)
        )

    def test_gpo_sampled_close_to_exact(self):
        db = gen_sets(n_sets=120, n_tokens=60, avg_size=6, seed=3)
        groups = np.random.default_rng(0).integers(0, 4, len(db.sets))
        exact = gpo.gpo(db.sets, groups)
        est = gpo.gpo(db.sets, groups, sample=4000, seed=1)
        assert est == pytest.approx(exact, rel=0.15)

    def test_phi_matches_gpo_of_single_group(self):
        sets = [np.array([0, 1]), np.array([1, 2]), np.array([0, 2])]
        assert gpo.phi(sets, [0, 1, 2]) == pytest.approx(
            gpo.gpo(sets, np.zeros(3, dtype=int))
        )


class TestTheory:
    def test_theorem_4_2_balance_lowers_f(self):
        """Under uniform tokens, balanced 2-way splits give lower F than
        skewed ones (Theorem 4.2). The proof's monotone-coverage argument
        needs unsaturated group unions, so keep token probability low."""
        sets = uniform_db(n_sets=40, n_tokens=200, p=0.05)
        n = len(sets)
        balanced = np.array([0] * (n // 2) + [1] * (n - n // 2))
        skewed = np.array([0] * (n // 10) + [1] * (n - n // 10))
        assert gpo.f_value(sets, balanced) < gpo.f_value(sets, skewed)

    def test_theorem_4_3_lower_u_higher_pe(self):
        """With balance fixed, lower U (Property 2) gives higher expected
        PE: coherent groups beat random groups."""
        rng = np.random.default_rng(5)
        # two disjoint-vocabulary clusters
        sets = [np.unique(rng.integers(0, 20, 6)) for _ in range(30)] + [
            np.unique(rng.integers(20, 40, 6)) for _ in range(30)
        ]
        coherent = np.array([0] * 30 + [1] * 30)
        mixed = np.array([i % 2 for i in range(60)])
        assert gpo.u_value(sets, coherent) < gpo.u_value(sets, mixed)
        queries = sets[::5]
        assert gpo.expected_pe(sets, coherent, queries) > gpo.expected_pe(
            sets, mixed, queries
        )

    def test_single_group_gpo_is_maximal(self):
        """§4.2: one mega-group attains the maximal possible GPO, so GPO
        implicitly penalizes imbalance."""
        rng = np.random.default_rng(7)
        sets = [np.unique(rng.integers(0, 30, 5)) for _ in range(20)]
        single = gpo.gpo(sets, np.zeros(20, dtype=int))
        for seed in range(3):
            some = np.random.default_rng(seed).integers(0, 4, 20)
            assert gpo.gpo(sets, some) <= single + 1e-9

    def test_loss_balance_example_of_section_5_1(self):
        """§5.1 worked example: equal pairwise distance d, N sets into two
        groups — total intra-group loss is minimized at N1 = N2."""
        d, n = 0.7, 10

        def loss(n1):
            n2 = n - n1
            return d / 2 * (n1 * (n1 - 1) + n2 * (n2 - 1))

        losses = [loss(n1) for n1 in range(n + 1)]
        assert np.argmin(losses) == n // 2


class TestBalanceAndPE:
    def test_balance_stats(self):
        st = gpo.balance_stats(np.array([0, 0, 1, 1, 1, 2]))
        assert st == {"n_groups": 3, "min": 1, "max": 3, "std": pytest.approx(np.std([2, 3, 1]))}

    def test_expected_pe_bounds(self):
        sets = uniform_db(n_sets=30)
        groups = np.arange(30) % 5
        pe = gpo.expected_pe(sets, groups, sets[:5])
        assert 0.0 <= pe <= 1.0

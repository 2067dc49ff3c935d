"""PTR set representation (paper §5.3) — including the paper's own
Table-1/Figure-5 worked example."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import ptr

# Paper example: T = {A, B, C, D} -> tokens 0..3
A, B, C, D = 0, 1, 2, 3


class TestPathTable:
    def test_paper_table_1(self):
        pt = ptr.path_table(4)
        assert pt.tolist() == [
            [1, 1, 0, 0],  # A
            [1, 0, 0, 1],  # B
            [0, 1, 1, 0],  # C
            [0, 0, 1, 1],  # D
        ]

    def test_second_half_is_complement(self):
        pt = ptr.path_table(13)
        h = pt.shape[1] // 2
        np.testing.assert_array_equal(pt[:, h:], 1 - pt[:, :h])

    def test_paths_are_unique(self):
        for n in (2, 5, 16, 33):
            pt = ptr.path_table(n)
            assert len({tuple(r) for r in pt.tolist()}) == n

    def test_height(self):
        assert ptr.path_height(4) == 2
        assert ptr.path_height(5) == 3
        assert ptr.path_height(1024) == 10
        assert ptr.path_height(1) == 1


class TestPTR:
    def test_paper_examples(self):
        # Rep({A,B,C}) = [2,2,1,1]; Rep({B,D}) = [1,0,1,2]
        reps = ptr.ptr([np.array([A, B, C]), np.array([B, D])], 4)
        assert reps.tolist() == [[2, 2, 1, 1], [1, 0, 1, 2]]

    def test_multiset_distinction(self):
        # Rep({A}) = [1,1,0,0], Rep({A,A}) = [2,2,0,0]
        reps = ptr.ptr([np.array([A]), np.array([A, A])], 4)
        assert reps.tolist() == [[1, 1, 0, 0], [2, 2, 0, 0]]

    def test_half_table_collision_example(self):
        """§5.3: on the half table, {A}, {B,C}, {A,D}, {B,C,D} ALL map to
        [1,1]; the full PTR reduces (not eliminates) the collisions —
        it still conflates {B,C} with {A,D} but separates the rest."""
        sets = [np.array([A]), np.array([B, C]), np.array([A, D]), np.array([B, C, D])]
        half = ptr.ptr_half(sets, 4)
        assert all(r == [1, 1] for r in half.tolist())
        full = ptr.ptr(sets, 4)
        distinct = {tuple(r) for r in full.tolist()}
        assert len(distinct) == 3  # strictly more separable than the half table
        assert tuple(full[0]) != tuple(full[1])

    def test_empty_set_is_zero_vector(self):
        reps = ptr.ptr([np.array([], dtype=np.int64)], 4)
        assert reps.tolist() == [[0, 0, 0, 0]]

    @settings(max_examples=40, deadline=None)
    @given(s=st.lists(st.integers(0, 31), min_size=0, max_size=12))
    def test_row_sum_property(self, s):
        """Each token contributes exactly h ones across the 2h positions,
        so the representation's total equals h * |S| (multiset size)."""
        n_tokens = 32
        h = ptr.path_height(n_tokens)
        rep = ptr.ptr([np.array(sorted(s), dtype=np.int64)], n_tokens)[0]
        assert rep.sum() == h * len(s)

    def test_dimension_is_2h(self):
        assert ptr.ptr([np.array([0])], 100).shape[1] == 2 * ptr.path_height(100)
        assert ptr.ptr_half([np.array([0])], 100).shape[1] == ptr.path_height(100)


class TestBinaryEncoding:
    def test_rows_unique_and_token_oblivious(self):
        sets = [np.array([5]), np.array([5]), np.array([1, 2, 3])]
        enc = ptr.binary_encoding(sets, 10)
        # identical sets get *different* codes — it encodes position only
        assert enc[0].tolist() != enc[1].tolist()
        assert len({tuple(r) for r in enc.tolist()}) == 3


class TestDispatch:
    @pytest.mark.parametrize("method", ["ptr", "ptr-half", "binary"])
    def test_represent_dispatch(self, method):
        out = ptr.represent([np.array([0, 1])], 8, method)
        assert out.shape[0] == 1

    def test_represent_unknown(self):
        with pytest.raises(ValueError):
            ptr.represent([np.array([0])], 8, "word2vec")

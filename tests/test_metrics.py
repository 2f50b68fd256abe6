"""ARI / AMI metric tests: hand-computed values, invariances, and the
paper's formula on explicit contingency tables."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.metrics import (ami, ari, contingency,
                                expected_mutual_information,
                                mutual_information)


class TestContingency:
    def test_basic(self):
        t = contingency([0, 0, 1, 1], [0, 1, 0, 1])
        assert t.tolist() == [[1, 1], [1, 1]]

    def test_relabeled(self):
        t = contingency([5, 5, 9], ["a", "a", "b"])
        assert t.tolist() == [[2, 0], [0, 1]]

    def test_mismatched_length_raises(self):
        with pytest.raises(ValueError):
            contingency([0, 1], [0])


class TestARI:
    def test_perfect(self):
        assert ari([0, 0, 1, 1, 2], [0, 0, 1, 1, 2]) == pytest.approx(1.0)

    def test_perfect_relabeled(self):
        assert ari([0, 0, 1, 1], [7, 7, 3, 3]) == pytest.approx(1.0)

    def test_known_value(self):
        # classic sklearn doc example
        assert ari([0, 0, 1, 1], [0, 0, 1, 2]) == pytest.approx(0.57, abs=0.005)

    def test_hand_computed(self):
        # contingency [[2,0],[1,1]]: sum_ij C2 = 1; a: [2,2] -> 2; b: [3,1] -> 3
        # exp = 2*3/6 = 1; max = 2.5; ari = (1-1)/(2.5-1) = 0
        assert ari([0, 0, 1, 1], [0, 0, 0, 1]) == pytest.approx(0.0)

    def test_symmetric(self):
        a = [0, 0, 1, 1, 2, 2, 0, 1]
        b = [0, 1, 1, 2, 2, 0, 0, 1]
        assert ari(a, b) == pytest.approx(ari(b, a))

    def test_independent_near_zero(self):
        rng = np.random.default_rng(0)
        vals = [ari(rng.integers(0, 4, 600), rng.integers(0, 4, 600))
                for _ in range(10)]
        assert abs(np.mean(vals)) < 0.02

    def test_single_cluster_each(self):
        assert ari([0, 0, 0], [1, 1, 1]) == pytest.approx(1.0)

    def test_opposite_split(self):
        # one big cluster vs all singletons
        a = [0] * 6
        b = list(range(6))
        # max_index == expected degenerate handled
        assert -1.0 <= ari(a, b) <= 1.0


class TestAMI:
    def test_perfect(self):
        assert ami([0, 0, 1, 1], [1, 1, 0, 0]) == pytest.approx(1.0)

    def test_known_value_exact(self):
        # MI = ln 2, EMI = 0.462098... (verified against the exact
        # permutation-model average in this file's history),
        # H = (ln2 + ln(2)/2 + ... ) -> AMI = 0.571428...
        assert ami([0, 0, 1, 1], [0, 0, 1, 2]) == pytest.approx(4.0 / 7.0, abs=1e-9)

    def test_independent_near_zero(self):
        rng = np.random.default_rng(1)
        vals = [ami(rng.integers(0, 3, 400), rng.integers(0, 3, 400))
                for _ in range(5)]
        assert abs(np.mean(vals)) < 0.02

    def test_mi_nonnegative(self):
        t = contingency([0, 0, 1, 1, 2], [0, 1, 1, 0, 2])
        assert mutual_information(t) >= 0

    def test_emi_between_zero_and_mi_bound(self):
        t = contingency([0, 0, 1, 1], [0, 1, 0, 1])
        emi = expected_mutual_information(t)
        assert 0 <= emi <= np.log(4)

    def test_symmetric(self):
        a = [0, 1, 0, 1, 2, 2]
        b = [0, 0, 1, 1, 2, 0]
        assert ami(a, b) == pytest.approx(ami(b, a))


@settings(max_examples=60, deadline=None)
@given(st.lists(st.integers(0, 3), min_size=4, max_size=40))
def test_ari_self_is_one(labels):
    assert ari(labels, labels) == pytest.approx(1.0)


@settings(max_examples=60, deadline=None)
@given(st.lists(st.integers(0, 3), min_size=4, max_size=30),
       st.permutations(range(4)))
def test_ari_label_permutation_invariant(labels, perm):
    permuted = [perm[x] for x in labels]
    assert ari(labels, permuted) == pytest.approx(1.0)

"""Similarity functions (Eqs. 2-6) pinned to Examples 6-9, 13, 14."""
import pytest
from hypothesis import given, settings

from repro.core.similarity import (
    mean_attr_similarity,
    sim_i,
    sim_j,
    sim_wi,
    sim_wj,
    tuple_frequencies,
    vec_jaccard,
)
from repro.datasets.laptop import TABLE_IV_BRAND
from repro.posets.poset import Poset, common_relation

from tests.test_posets import spo_strategy


@pytest.fixture(scope="module")
def clusters():
    return {
        "U1": common_relation([TABLE_IV_BRAND["c1"], TABLE_IV_BRAND["c2"]]),
        "U2": common_relation([TABLE_IV_BRAND["c3"], TABLE_IV_BRAND["c4"]]),
        "U3": common_relation([TABLE_IV_BRAND["c5"], TABLE_IV_BRAND["c6"]]),
    }


class TestExample6IntersectionSize:
    def test_u1_u2_disjoint(self, clusters):
        assert sim_i(clusters["U1"], clusters["U2"]) == 0

    def test_u1_u3(self, clusters):
        assert sim_i(clusters["U1"], clusters["U3"]) == 2
        assert clusters["U1"].pairs & clusters["U3"].pairs == {
            ("Apple", "Samsung"),
            ("Lenovo", "Samsung"),
        }

    def test_u2_u3(self, clusters):
        assert sim_i(clusters["U2"], clusters["U3"]) == 2
        assert clusters["U2"].pairs & clusters["U3"].pairs == {
            ("Lenovo", "Apple"),
            ("Lenovo", "Toshiba"),
        }


class TestExample7Jaccard:
    def test_union_sizes(self, clusters):
        assert len(clusters["U1"].pairs | clusters["U3"].pairs) == 6
        assert len(clusters["U2"].pairs | clusters["U3"].pairs) == 7

    def test_jaccard_values(self, clusters):
        assert sim_j(clusters["U1"], clusters["U3"]) == pytest.approx(2 / 6)
        assert sim_j(clusters["U2"], clusters["U3"]) == pytest.approx(2 / 7)

    def test_jaccard_orders_differently_than_intersection(self, clusters):
        assert sim_i(clusters["U1"], clusters["U3"]) == sim_i(clusters["U2"], clusters["U3"])
        assert sim_j(clusters["U1"], clusters["U3"]) > sim_j(clusters["U2"], clusters["U3"])


class TestExample8WeightedIntersection:
    def test_maximal_values(self, clusters):
        assert clusters["U1"].maximal_values == {"Apple", "Toshiba"}
        assert clusters["U2"].maximal_values == {"Samsung"}
        assert clusters["U3"].maximal_values == {"Lenovo"}

    def test_u1_weights(self, clusters):
        w = clusters["U1"].weight
        assert (w("Apple"), w("Lenovo"), w("Samsung"), w("Toshiba")) == (1, 1 / 2, 1 / 2, 1)

    def test_u2_weights(self, clusters):
        w = clusters["U2"].weight
        assert (w("Apple"), w("Lenovo"), w("Samsung"), w("Toshiba")) == (1 / 3, 1 / 2, 1, 1 / 3)

    def test_u3_weights(self, clusters):
        w = clusters["U3"].weight
        assert (w("Apple"), w("Lenovo"), w("Samsung"), w("Toshiba")) == (1 / 2, 1, 1 / 3, 1 / 2)

    def test_sim_wi_values(self, clusters):
        assert sim_wi(clusters["U1"], clusters["U3"]) == pytest.approx(3 / 2)
        assert sim_wi(clusters["U2"], clusters["U3"]) == pytest.approx(3 / 2)


class TestExample9WeightedJaccard:
    def test_values(self, clusters):
        assert sim_wj(clusters["U1"], clusters["U3"]) == pytest.approx(3 / 11)
        assert sim_wj(clusters["U2"], clusters["U3"]) == pytest.approx(3 / 12)

    def test_discriminates_where_wi_ties(self, clusters):
        assert sim_wj(clusters["U1"], clusters["U3"]) > sim_wj(clusters["U2"], clusters["U3"])


class TestSectionVIC:
    def test_example13_vector_jaccard(self):
        v1 = tuple_frequencies(["c1", "c2"], TABLE_IV_BRAND)
        v3 = tuple_frequencies(["c5", "c6"], TABLE_IV_BRAND)
        assert v1[("Toshiba", "Lenovo")] == pytest.approx(1 / 2)
        assert vec_jaccard(v1, v3) == pytest.approx(2.5 / 7)
        assert round(vec_jaccard(v1, v3), 2) == 0.36

    def test_example14_weighted_vector_jaccard(self):
        v1 = tuple_frequencies(["c1", "c2"], TABLE_IV_BRAND, weighted=True)
        v3 = tuple_frequencies(["c5", "c6"], TABLE_IV_BRAND, weighted=True)
        assert v3[("Apple", "Toshiba")] == pytest.approx(1 / 4)
        assert vec_jaccard(v1, v3) == pytest.approx(1.25 / 6.75)
        assert round(vec_jaccard(v1, v3), 2) == 0.19

    def test_singleton_vector_jaccard_equals_set_jaccard(self):
        for a in TABLE_IV_BRAND:
            for b in TABLE_IV_BRAND:
                va = tuple_frequencies([a], TABLE_IV_BRAND)
                vb = tuple_frequencies([b], TABLE_IV_BRAND)
                assert vec_jaccard(va, vb) == pytest.approx(
                    sim_j(TABLE_IV_BRAND[a], TABLE_IV_BRAND[b])
                )


class TestSimilarityProperties:
    @given(spo_strategy(), spo_strategy())
    @settings(max_examples=30, deadline=None)
    def test_symmetry_all_measures(self, d1, d2):
        p1, p2 = Poset(d1[0], domain=d1[1]), Poset(d2[0], domain=d2[1])
        for f in (sim_i, sim_j, sim_wi, sim_wj):
            assert f(p1, p2) == pytest.approx(f(p2, p1))

    @given(spo_strategy())
    @settings(max_examples=30, deadline=None)
    def test_self_similarity_is_max(self, d):
        p = Poset(d[0], domain=d[1])
        assert sim_j(p, p) == 1.0
        assert sim_wj(p, p) == 1.0

    def test_identical_empty_relations(self):
        e = Poset([], domain=["a"])
        assert sim_j(e, e) == 1.0
        assert sim_wj(e, e) == 1.0
        assert vec_jaccard({}, {}) == 1.0

    def test_mean_attr_similarity(self):
        assert mean_attr_similarity([1.0, 0.0]) == 0.5
        assert mean_attr_similarity([]) == 0.0

"""CPS chain-product embedding: correctness of the paper's poset substrate."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.posets.cps import chain_decomposition, cps_embedding, cps_prefers
from repro.posets.poset import Poset

from tests.test_posets import spo_strategy


def _chain_poset():
    return Poset([("a", "b"), ("b", "c"), ("c", "d")])


class TestChainDecomposition:
    def test_total_order_is_one_chain(self):
        chains = chain_decomposition(_chain_poset())
        assert chains == [["a", "b", "c", "d"]]

    def test_antichain_is_singletons(self):
        p = Poset([], domain=["x", "y", "z"])
        chains = chain_decomposition(p)
        assert sorted(map(tuple, chains)) == [("x",), ("y",), ("z",)]

    def test_chains_cover_domain_exactly_once(self):
        p = Poset([("a", "b"), ("a", "c"), ("b", "d"), ("c", "d")], domain="abcde")
        chains = chain_decomposition(p)
        flat = [v for ch in chains for v in ch]
        assert sorted(flat) == sorted(p.domain)

    def test_chains_are_descending(self):
        p = Poset([("a", "b"), ("a", "c"), ("b", "d"), ("c", "d")])
        for ch in chain_decomposition(p):
            for i in range(len(ch) - 1):
                assert p.prefers(ch[i], ch[i + 1])

    @given(spo_strategy())
    @settings(max_examples=40, deadline=None)
    def test_random_poset_cover(self, data):
        pairs, dom = data
        p = Poset(pairs, domain=dom)
        flat = [v for ch in chain_decomposition(p) for v in ch]
        assert sorted(flat) == sorted(p.domain)


class TestEmbedding:
    def test_chain_coordinates(self):
        p = _chain_poset()
        coords = cps_embedding(p)
        assert coords["a"] == (4,) and coords["d"] == (1,)

    def test_equal_vectors_iff_equal_values(self):
        p = Poset([("a", "b")], domain=["a", "b", "z"])
        coords = cps_embedding(p)
        assert len(set(coords.values())) == 3

    @given(spo_strategy())
    @settings(max_examples=60, deadline=None)
    def test_embedding_preserves_order_exactly(self, data):
        """v ≻ w  ⟺  coords(v) ≥ coords(w) ∧ v ≠ w — on random posets."""
        pairs, dom = data
        p = Poset(pairs, domain=dom)
        coords = cps_embedding(p)
        for v in p.domain:
            for w in p.domain:
                if v == w:
                    continue
                assert p.prefers(v, w) == cps_prefers(coords, v, w)

    def test_incomparable_values_incomparable_vectors(self):
        p = Poset([("a", "b"), ("c", "d")], domain="abcd")
        coords = cps_embedding(p)
        assert not cps_prefers(coords, "a", "c")
        assert not cps_prefers(coords, "c", "a")

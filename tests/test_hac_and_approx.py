"""HAC dendrogram/branch cut (Def. 7, Example 10) and Algorithm 3
(GetApproxPreferenceTuples, Example 11, Lemma 2, Theorems 3/4)."""
import numpy as np
import pytest

from repro.core.approx import approx_cluster_relation, get_approx_preference_tuples
from repro.core.common import cluster_common_relation
from repro.core.dominance import Profile, brute_force_frontier
from repro.core.hac import cluster_users
from repro.datasets.laptop import TABLE_IV_BRAND
from repro.posets.poset import Poset, common_relation, is_strict_partial_order


def _prefs_table_iv():
    # one-attribute preference profiles for the six Table IV users
    return {c: {"brand": p} for c, p in TABLE_IV_BRAND.items()}


class TestHAC:
    def test_theta_1_is_singletons(self):
        d = cluster_users(["brand"], _prefs_table_iv(), measure="jaccard")
        assert d.theta(1.0) == [(c,) for c in sorted(TABLE_IV_BRAND)]

    def test_merges_are_recorded_with_sims(self):
        d = cluster_users(["brand"], _prefs_table_iv(), measure="jaccard")
        assert len(d.merges) == 5  # all the way to one cluster
        assert all(0 <= m.sim <= 1 for m in d.merges)

    def test_example10_pairs_merge_first(self):
        # The natural pairs (c1,c2), (c3,c4), (c5,c6) are the most similar
        # and must appear as the first three merges.
        d = cluster_users(["brand"], _prefs_table_iv(), measure="jaccard")
        first3 = {frozenset(m.left + m.right) for m in d.merges[:3]}
        assert first3 == {
            frozenset({"c1", "c2"}),
            frozenset({"c3", "c4"}),
            frozenset({"c5", "c6"}),
        }

    def test_example10_cut_merges_u1_u3_before_u2(self):
        # Example 10: θ(t) = {{c1,c2,c5,c6}, {c3,c4}} for 3/11 ≥ t > 0
        # (under weighted Jaccard; sim(U1,U3)=3/11 > sim(U2,U3)=3/12).
        d = cluster_users(["brand"], _prefs_table_iv(), measure="weighted_jaccard")
        part = d.theta(3 / 11 - 1e-9)
        assert sorted(map(sorted, part)) == [["c1", "c2", "c5", "c6"], ["c3", "c4"]]

    def test_partitions_coarsen_as_h_decreases(self):
        d = cluster_users(["brand"], _prefs_table_iv(), measure="jaccard")
        sizes = [len(d.theta(h)) for h in (1.0, 0.7, 0.4, 0.1, 0.0)]
        assert sizes == sorted(sizes, reverse=True)

    def test_every_theta_is_a_partition(self):
        d = cluster_users(["brand"], _prefs_table_iv(), measure="vector_jaccard")
        for h in (1.0, 0.8, 0.5, 0.2, 0.0):
            part = d.theta(h)
            flat = [u for cl in part for u in cl]
            assert sorted(flat) == sorted(TABLE_IV_BRAND)

    def test_all_measures_run(self):
        for m in (
            "intersection",
            "jaccard",
            "weighted_intersection",
            "weighted_jaccard",
            "vector_jaccard",
            "weighted_vector_jaccard",
        ):
            d = cluster_users(["brand"], _prefs_table_iv(), measure=m)
            assert len(d.merges) == 5

    def test_unknown_measure_rejected(self):
        with pytest.raises(ValueError):
            cluster_users(["brand"], _prefs_table_iv(), measure="cosine")

    def test_initial_sims_seed_is_used(self):
        prefs = _prefs_table_iv()
        users = sorted(prefs)
        # Degenerate seed: force c1-c6 to be the most similar pair.
        seed = {(a, b): 0.0 for i, a in enumerate(users) for b in users[i + 1 :]}
        seed[("c1", "c6")] = 1.0
        d = cluster_users(["brand"], prefs, measure="jaccard", initial_sims=seed)
        assert frozenset(d.merges[0].left + d.merges[0].right) == frozenset({"c1", "c6"})


class TestGetApproxPreferenceTuples:
    """Example 11: three users, threshold1 = 7, threshold2 = 60%."""

    @pytest.fixture()
    def fig3_users(self):
        # Fig. 3a reconstructed so the frequency table (Table V) comes out
        # exactly: (A,T):3/3; (A,S),(L,T),(T,S),(S,L):2/3;
        # (A,L),(L,S),(T,L),(S,T):1/3; (L,A),(T,A),(S,A):0.
        A, L, S, T = "Apple", "Lenovo", "Samsung", "Toshiba"
        dom = (A, L, S, T)
        u1 = Poset([(A, T), (T, S), (S, L)], domain=dom)  # chain A≻T≻S≻L
        u2 = Poset([(A, T), (T, S), (L, T)], domain=dom)  # A≻T≻S, L≻T
        u3 = Poset([(A, T), (S, L), (L, T)], domain=dom)  # A≻T, S≻L≻T
        return {"u1": u1, "u2": u2, "u3": u3}

    def test_table5_frequencies(self, fig3_users):
        n = 3
        freq = {}
        for p in fig3_users.values():
            for pair in p.pairs:
                freq[pair] = freq.get(pair, 0) + 1 / n
        A, L, S, T = "Apple", "Lenovo", "Samsung", "Toshiba"
        assert freq[(A, T)] == pytest.approx(1.0)
        for pair in [(A, S), (L, T), (T, S), (S, L)]:
            assert freq[pair] == pytest.approx(2 / 3), pair
        for pair in [(A, L), (L, S), (T, L), (S, T)]:
            assert freq[pair] == pytest.approx(1 / 3), pair

    def test_example11_result(self, fig3_users):
        A, L, S, T = "Apple", "Lenovo", "Samsung", "Toshiba"
        # Table V's tie order among the 2/3-frequency tuples: (A,S), (L,T),
        # (T,S) then (S,L).
        got = get_approx_preference_tuples(
            list(fig3_users),
            fig3_users,
            threshold1=7,
            threshold2=0.6,
            tie_order=[(A, S), (L, T), (T, S), (S, L)],
        )
        # Common tuple (A,T); approximations (A,S), (L,T), (T,S); plus the
        # transitive closure (L,S); (S,L) rejected (its reverse is already
        # in); the walk stops at (A,L) whose frequency is below 60%.
        assert got.pairs == {(A, T), (A, S), (L, T), (T, S), (L, S)}

    def test_lemma2_property1_superset_of_common(self, fig3_users):
        common = common_relation(fig3_users.values())
        approx = get_approx_preference_tuples(list(fig3_users), fig3_users, threshold2=0.6)
        assert approx.pairs >= common.pairs

    def test_threshold2_one_gives_exactly_common(self, fig3_users):
        common = common_relation(fig3_users.values())
        approx = get_approx_preference_tuples(list(fig3_users), fig3_users, threshold2=1.0)
        assert approx.pairs == common.pairs

    def test_threshold1_zero_still_keeps_common(self, fig3_users):
        common = common_relation(fig3_users.values())
        approx = get_approx_preference_tuples(
            list(fig3_users), fig3_users, threshold1=0, threshold2=0.0
        )
        assert approx.pairs == common.pairs

    def test_result_is_strict_partial_order(self, fig3_users):
        for t2 in (0.0, 0.3, 0.6, 0.9):
            got = get_approx_preference_tuples(list(fig3_users), fig3_users, threshold2=t2)
            assert is_strict_partial_order(got.pairs)

    def test_empty_cluster_rejected(self):
        with pytest.raises(ValueError):
            get_approx_preference_tuples([], {})


class TestTheorems3And4:
    """Random-data checks of P_aU ⊆ P_U and P_aU ∩ P_c ⊆ P_ac."""

    @staticmethod
    def _random_setup(seed):
        rng = np.random.default_rng(seed)
        dom = [f"v{i}" for i in range(6)]
        attrs = ["d0", "d1"]

        def rand_poset():
            order = list(rng.permutation(dom))
            pairs = [
                (order[i], order[j])
                for i in range(len(order))
                for j in range(i + 1, len(order))
                if rng.random() < 0.4
            ]
            return Poset(pairs, domain=dom)

        users = {f"c{k}": {d: rand_poset() for d in attrs} for k in range(4)}
        objects = {
            f"o{i}": tuple(rng.choice(dom) for _ in attrs) for i in range(40)
        }
        return attrs, dom, users, objects

    @pytest.mark.parametrize("seed", range(8))
    def test_theorem3_and_4(self, seed):
        attrs, dom, users, objects = self._random_setup(seed)
        members = list(users)
        domains = {d: dom for d in attrs}
        common = cluster_common_relation(members, users, attrs)
        approx = approx_cluster_relation(members, users, attrs, threshold2=0.5)
        p_u = brute_force_frontier(Profile(attrs, common, domains), objects)
        p_au = brute_force_frontier(Profile(attrs, approx, domains), objects)
        assert p_au <= p_u  # Theorem 3
        for c in members:
            p_c = brute_force_frontier(Profile(attrs, users[c], domains), objects)
            assert p_c <= p_u  # Theorem 2
            # Theorem 4: P_aU ∩ P_c ⊆ P_ac where P_ac is the frontier the
            # approximate pipeline computes for c (filter by aU, verify by c).
            p_ac = {
                o
                for o in p_au
                if not any(
                    Profile(attrs, users[c], domains).dominates(objects[o2], objects[o])
                    for o2 in p_au
                    if o2 != o
                )
            }
            assert (p_au & p_c) <= p_ac

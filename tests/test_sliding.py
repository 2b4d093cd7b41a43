"""Sliding-window engines (Algorithms 4-5): paper examples + brute-force
window-frontier equivalence at every step on random streams."""
import numpy as np
import pytest

from repro.core.baseline import BaselineEngine
from repro.core.common import cluster_common_relation, make_exact_clusters
from repro.core.dominance import Profile, brute_force_frontier
from repro.core.sliding import BaselineSWEngine, FTVSWEngine
from repro.datasets import laptop
from repro.posets.poset import Poset


def _stream_table_i(engine, upto):
    for i in range(1, upto + 1):
        engine.insert(f"o{i}", laptop.PRODUCTS[f"o{i}"])


def _stream_table_viii(engine, upto):
    for i in range(1, upto + 1):
        engine.insert(f"o{i}", laptop.SW_PRODUCTS[f"o{i}"])


class TestExample15:
    """W = 5, in = 10: window (5, 10] ⇒ P_c1 = {o8}, P_c2 = {o7, o8}."""

    def test_baseline_sw(self):
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=5)
        _stream_table_i(eng, 10)
        assert eng.frontier_of("c1") == {"o8"}
        assert eng.frontier_of("c2") == {"o7", "o8"}

    def test_ftv_sw(self):
        clusters = make_exact_clusters([["c1", "c2"]], laptop.USER_PREFS, laptop.ATTRS)
        eng = FTVSWEngine(
            laptop.ATTRS, clusters, laptop.USER_PREFS, laptop.DOMAINS, window=5
        )
        _stream_table_i(eng, 10)
        assert eng.frontier_of("c1") == {"o8"}
        assert eng.frontier_of("c2") == {"o7", "o8"}


class TestExample16:
    def test_pareto_buffer_c1(self):
        # PB_c1 over (5, 10] = {o8, o9, o10}: o6, o7 are dominated by the
        # later o8 (Thm. 5) so they are never buffered.
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=5)
        _stream_table_i(eng, 10)
        assert eng.buffer_of("c1") == {"o8", "o9", "o10"}

    def test_o10_acquires_pareto_optimality_after_o8_expires(self):
        # Example 16: o10 becomes Pareto-optimal once o8 leaves (window
        # (8, 13]).
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=5)
        _stream_table_i(eng, 13)
        assert "o10" in eng.frontier_of("c1")
        assert ("c1", "o10") in eng.disseminated


class TestExample17:
    """Table VIII stream, W = 6. The cluster-level rows of Table X
    (P_U and the final target users C_{o7}) reproduce exactly; the
    per-user rows of Tables IX/X contradict Table II's preferences (e.g.
    Example 2's tuple (10-12.9, 16-18.9) ∈ ≻_c1 forces o3 ≻_c1 o1), so
    per-user sets are pinned to their Def. 9/10 values — DESIGN.md
    erratum #3."""

    def test_baseline_sw_phase1(self):
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=6)
        _stream_table_viii(eng, 6)
        assert eng.frontier_of("c1") == {"o3"}  # paper: {o1, o3} (erratum)
        # o6 = (10-12.9, Samsung, quad) is undominated for c2 (Apple and
        # Samsung are incomparable, quad is c2's top CPU) — the paper's
        # {o3, o4} misses it.
        assert eng.frontier_of("c2") == {"o3", "o4", "o6"}
        assert eng.buffer_of("c1") == {"o3", "o4", "o5", "o6"}
        assert eng.buffer_of("c2") == {"o3", "o4", "o6"}

    def test_baseline_sw_phase3(self):
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=6)
        _stream_table_viii(eng, 7)
        assert eng.frontier_of("c1") == {"o7"}
        assert eng.frontier_of("c2") == {"o4", "o6", "o7"}
        assert eng.buffer_of("c1") == {"o7"}  # o7 ≻_c1 o4 (Thm. 5)
        assert eng.buffer_of("c2") == {"o4", "o6", "o7"}

    def test_ftv_sw_phases(self):
        clusters = make_exact_clusters([["c1", "c2"]], laptop.USER_PREFS, laptop.ATTRS)
        eng = FTVSWEngine(
            laptop.ATTRS, clusters, laptop.USER_PREFS, laptop.DOMAINS, window=6
        )
        _stream_table_viii(eng, 6)
        # Table X says P_U = {o1, o3, o4} but o6 is undominated w.r.t. ≻_U
        # too (erratum #3) — Def. 9 keeps it.
        assert eng.cluster_frontier_of(0) == {"o1", "o3", "o4", "o6"}
        assert eng.frontier_of("c1") == {"o3"}  # Def. 9 (erratum #3)
        assert eng.frontier_of("c2") == {"o3", "o4", "o6"}
        assert eng.cluster_buffer_of(0) == {"o1", "o3", "o4", "o5", "o6"}  # Table X
        # o7 arrives (and o1 expires): Table X final phase. The paper drops
        # o6 but o7 ⊁_U o6 (dual vs quad incomparable in ≻_U^cpu) — Def. 10
        # keeps it (DESIGN.md erratum #2).
        targets = eng.insert("o7", laptop.SW_PRODUCTS["o7"])
        assert targets == {"c1", "c2"}  # C_{o7} = {c1, c2}, as the paper says
        assert eng.cluster_frontier_of(0) == {"o4", "o6", "o7"}
        assert eng.frontier_of("c1") == {"o7"}
        assert eng.frontier_of("c2") == {"o4", "o6", "o7"}
        assert eng.cluster_buffer_of(0) == {"o4", "o6", "o7"}

    def test_after_expiry_of_o1(self):
        # Window (1, 6]: o1 has expired; per-user and cluster frontiers
        # match Def. 9 (o6 included, erratum #3).
        eng = BaselineSWEngine(laptop.ATTRS, laptop.USER_PREFS, laptop.DOMAINS, window=5)
        _stream_table_viii(eng, 6)  # window (1, 6]
        assert eng.frontier_of("c1") == {"o3"}
        assert eng.frontier_of("c2") == {"o3", "o4", "o6"}
        clusters = make_exact_clusters([["c1", "c2"]], laptop.USER_PREFS, laptop.ATTRS)
        ftv = FTVSWEngine(
            laptop.ATTRS, clusters, laptop.USER_PREFS, laptop.DOMAINS, window=5
        )
        _stream_table_viii(ftv, 6)
        assert ftv.cluster_frontier_of(0) == {"o3", "o4", "o6"}


def _random_setup(seed, n_users=4, n_attrs=3, dom_size=5):
    rng = np.random.default_rng(seed)
    dom = [f"v{i}" for i in range(dom_size)]
    attrs = [f"d{i}" for i in range(n_attrs)]

    def rand_poset():
        order = list(rng.permutation(dom))
        pairs = [
            (order[i], order[j])
            for i in range(len(order))
            for j in range(i + 1, len(order))
            if rng.random() < 0.45
        ]
        return Poset(pairs, domain=dom)

    users = {f"c{k}": {d: rand_poset() for d in attrs} for k in range(n_users)}
    stream = [
        (f"o{t}", tuple(rng.choice(dom) for _ in attrs)) for t in range(60)
    ]
    domains = {d: dom for d in attrs}
    return attrs, domains, users, stream


class TestRandomStreamInvariants:
    """Def. 9/10 checked by brute force after *every* arrival."""

    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("window", [3, 7, 20])
    def test_baseline_sw_equals_window_brute_force(self, seed, window):
        attrs, domains, users, stream = _random_setup(seed)
        eng = BaselineSWEngine(attrs, users, domains, window=window)
        profiles = {c: Profile(attrs, p, domains) for c, p in users.items()}
        for t, (oid, obj) in enumerate(stream, start=1):
            eng.insert(oid, obj)
            alive = dict(stream[max(0, t - window) : t])
            for c in users:
                expect = brute_force_frontier(profiles[c], alive)
                assert eng.frontier_of(c) == expect, (oid, c)

    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("window", [3, 7, 20])
    def test_ftv_sw_equals_window_brute_force(self, seed, window):
        attrs, domains, users, stream = _random_setup(seed)
        members = sorted(users)
        partition = [members[:2], members[2:]]
        clusters = make_exact_clusters(partition, users, attrs)
        eng = FTVSWEngine(attrs, clusters, users, domains, window=window)
        profiles = {c: Profile(attrs, p, domains) for c, p in users.items()}
        cluster_profiles = {
            cl.cluster_id: Profile(attrs, cl.relation, domains) for cl in clusters
        }
        for t, (oid, obj) in enumerate(stream, start=1):
            eng.insert(oid, obj)
            alive = dict(stream[max(0, t - window) : t])
            for cl in clusters:
                # P_U is the window frontier of the virtual user (Def. 9).
                assert eng.cluster_frontier_of(cl.cluster_id) == brute_force_frontier(
                    cluster_profiles[cl.cluster_id], alive
                ), (oid, cl.cluster_id)
                for c in cl.members:
                    assert eng.frontier_of(c) == brute_force_frontier(
                        profiles[c], alive
                    ), (oid, c)

    @pytest.mark.parametrize("seed", range(4))
    def test_buffer_definition_10(self, seed):
        """PB_c = alive objects not dominated by any *later* alive object."""
        attrs, domains, users, stream = _random_setup(seed)
        window = 9
        eng = BaselineSWEngine(attrs, users, domains, window=window)
        profiles = {c: Profile(attrs, p, domains) for c, p in users.items()}
        for t, (oid, obj) in enumerate(stream, start=1):
            eng.insert(oid, obj)
            alive = stream[max(0, t - window) : t]
            for c in users:
                expect = set()
                for i, (oi, vi) in enumerate(alive):
                    if not any(
                        profiles[c].dominates(vj, vi) for oj, vj in alive[i + 1 :]
                    ):
                        expect.add(oi)
                assert eng.buffer_of(c) == expect, (oid, c)

    @pytest.mark.parametrize("seed", range(4))
    def test_theorem6_buffer_superset(self, seed):
        """PB_U ⊇ P_U and PB_U ⊇ PB_c for every member c."""
        attrs, domains, users, stream = _random_setup(seed)
        window = 9
        members = sorted(users)
        clusters = make_exact_clusters([members], users, attrs)
        ftv = FTVSWEngine(attrs, clusters, users, domains, window=window)
        base = BaselineSWEngine(attrs, users, domains, window=window)
        for oid, obj in stream:
            ftv.insert(oid, obj)
            base.insert(oid, obj)
            pb_u = ftv.cluster_buffer_of(0)
            assert ftv.cluster_frontier_of(0) <= pb_u
            for c in members:
                assert base.buffer_of(c) <= pb_u

    @pytest.mark.parametrize("seed", range(6))
    def test_dissemination_sets_agree(self, seed):
        """BaselineSW and exact FilterThenVerifySW deliver identical
        (user, object) pairs — the exact variant loses nothing."""
        attrs, domains, users, stream = _random_setup(seed)
        window = 8
        members = sorted(users)
        clusters = make_exact_clusters([members[:2], members[2:]], users, attrs)
        ftv = FTVSWEngine(attrs, clusters, users, domains, window=window)
        base = BaselineSWEngine(attrs, users, domains, window=window)
        for oid, obj in stream:
            ftv.insert(oid, obj)
            base.insert(oid, obj)
        assert ftv.disseminated == base.disseminated

    @pytest.mark.parametrize("seed", range(3))
    def test_theorem5_never_disseminated_after_later_dominator(self, seed):
        """Thm. 5: an object dominated by a later object never (re)enters
        the frontier after that arrival."""
        attrs, domains, users, stream = _random_setup(seed)
        eng = BaselineSWEngine(attrs, users, domains, window=10)
        profiles = {c: Profile(attrs, p, domains) for c, p in users.items()}
        dead: set[tuple[str, str]] = set()  # (user, object) pairs
        for t, (oid, obj) in enumerate(stream, start=1):
            for c in users:
                for oid2, obj2 in stream[max(0, t - 10) : t - 1]:
                    if profiles[c].dominates(obj, obj2):
                        dead.add((c, oid2))
            eng.insert(oid, obj)
            for c in users:
                for f in eng.frontier_of(c):
                    assert (c, f) not in dead

    def test_window_larger_than_stream_matches_append_only(self):
        attrs, domains, users, stream = _random_setup(0)
        sw = BaselineSWEngine(attrs, users, domains, window=10_000)
        append = BaselineEngine(attrs, users, domains)
        for oid, obj in stream:
            assert sw.insert(oid, obj) == append.insert(oid, obj)
        for c in users:
            assert sw.frontier_of(c) == append.frontier_of(c)

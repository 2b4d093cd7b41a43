"""Dominance kernels: matrix Profile vs raw closure vs CPS embedding."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.dominance import (
    ComparisonCounter,
    Profile,
    brute_force_frontier,
    dominates_by_closure,
)
from repro.posets.cps import cps_embedding, cps_prefers
from repro.posets.poset import Poset

from tests.test_posets import spo_strategy


def _profile_from(data1, data2):
    attrs = ["d0", "d1"]
    p0 = Poset(data1[0], domain=data1[1])
    p1 = Poset(data2[0], domain=data2[1])
    prefs = {"d0": p0, "d1": p1}
    domains = {"d0": sorted(p0.domain), "d1": sorted(p1.domain)}
    return attrs, prefs, domains


class TestKernelEquivalence:
    @given(spo_strategy(), spo_strategy(), st.integers(0, 2**31 - 1))
    @settings(max_examples=40, deadline=None)
    def test_matrix_equals_closure_reference(self, d0, d1, seed):
        attrs, prefs, domains = _profile_from(d0, d1)
        profile = Profile(attrs, prefs, domains)
        rng = np.random.default_rng(seed)
        objs = [
            (rng.choice(domains["d0"]), rng.choice(domains["d1"])) for _ in range(8)
        ]
        for a in objs:
            for b in objs:
                assert profile.dominates(a, b) == dominates_by_closure(
                    attrs, prefs, a, b
                ), (a, b)

    @given(spo_strategy(), spo_strategy(), st.integers(0, 2**31 - 1))
    @settings(max_examples=30, deadline=None)
    def test_matrix_equals_cps_embedding(self, d0, d1, seed):
        """Object dominance via per-attribute CPS coordinates matches the
        matrix kernel — the paper's CPS substrate is interchangeable."""
        attrs, prefs, domains = _profile_from(d0, d1)
        profile = Profile(attrs, prefs, domains)
        coords = {d: cps_embedding(prefs[d]) for d in attrs}
        rng = np.random.default_rng(seed)
        objs = [
            (rng.choice(domains["d0"]), rng.choice(domains["d1"])) for _ in range(8)
        ]

        def cps_dominates(a, b):
            strict = False
            for k, d in enumerate(attrs):
                if a[k] == b[k]:
                    continue
                if cps_prefers(coords[d], a[k], b[k]):
                    strict = True
                else:
                    return False
            return strict

        for a in objs:
            for b in objs:
                assert profile.dominates(a, b) == cps_dominates(a, b), (a, b)


class TestProfileBasics:
    def _simple(self):
        p = Poset([("hi", "lo")])
        return Profile(["d0", "d1"], {"d0": p, "d1": p}, {"d0": ["hi", "lo"], "d1": ["hi", "lo"]})

    def test_identical_objects_do_not_dominate(self):
        pr = self._simple()
        assert not pr.dominates(("hi", "lo"), ("hi", "lo"))

    def test_strict_on_one_equal_on_other(self):
        pr = self._simple()
        assert pr.dominates(("hi", "lo"), ("lo", "lo"))

    def test_conflicting_attrs_incomparable(self):
        pr = self._simple()
        assert not pr.dominates(("hi", "lo"), ("lo", "hi"))
        assert not pr.dominates(("lo", "hi"), ("hi", "lo"))

    def test_compare_masks_partition(self):
        pr = self._simple()
        F = np.vstack([pr.encode(v) for v in [("hi", "hi"), ("lo", "lo"), ("hi", "lo")]])
        m = pr.compare(F, pr.encode(("hi", "lo")))
        assert m.n_compared == 3
        assert m.dominated_by.tolist() == [True, False, False]
        assert m.dominates.tolist() == [False, True, False]
        assert m.identical.tolist() == [False, False, True]

    def test_empty_frontier(self):
        pr = self._simple()
        m = pr.compare(np.zeros((0, 2), dtype=np.int32), pr.encode(("hi", "lo")))
        assert m.n_compared == 0 and not m.dominated_by.any()

    def test_encode_unknown_value_raises(self):
        pr = self._simple()
        with pytest.raises(KeyError):
            pr.encode(("hi", "nope"))

    def test_brute_force_frontier_tiny(self):
        pr = self._simple()
        objs = {"a": ("hi", "hi"), "b": ("lo", "lo"), "c": ("hi", "lo")}
        assert brute_force_frontier(pr, objs) == {"a"}

    def test_brute_force_keeps_identical_objects(self):
        pr = self._simple()
        objs = {"a": ("hi", "hi"), "b": ("hi", "hi")}
        assert brute_force_frontier(pr, objs) == {"a", "b"}


class TestComparisonCounter:
    def test_accumulates_by_stage(self):
        c = ComparisonCounter()
        c.add("user", 3)
        c.add("cluster", 2)
        c.add("user", 1)
        assert c.total == 6
        assert c.by_stage == {"user": 4, "cluster": 2}

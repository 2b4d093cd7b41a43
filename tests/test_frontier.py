"""Frontier container (the compare-and-update step shared by Algs. 1-5)."""
import numpy as np
import pytest

from repro.core.dominance import Profile
from repro.core.frontier import Frontier
from repro.posets.poset import Poset


@pytest.fixture()
def profile():
    p = Poset([("a", "b"), ("b", "c")])
    dom = ["a", "b", "c"]
    return Profile(["d0", "d1"], {"d0": p, "d1": p}, {"d0": dom, "d1": dom})


@pytest.fixture()
def frontier(profile):
    return Frontier(profile)


def enc(profile, v):
    return profile.encode(v)


class TestInsert:
    def test_first_object_always_pareto(self, profile, frontier):
        res = frontier.insert("o1", enc(profile, ("b", "b")))
        assert res.is_pareto and res.removed == [] and res.n_compared == 0
        assert frontier.ids == ["o1"]

    def test_dominated_object_rejected(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "a")))
        res = frontier.insert("o2", enc(profile, ("b", "b")))
        assert not res.is_pareto and res.n_compared == 1
        assert frontier.ids == ["o1"]

    def test_dominating_object_evicts(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("b", "b")))
        frontier.insert("o2", enc(profile, ("c", "a")))  # incomparable to o1
        res = frontier.insert("o3", enc(profile, ("a", "a")))
        assert res.is_pareto and set(res.removed) == {"o1", "o2"}
        assert frontier.ids == ["o3"]

    def test_identical_object_coexists(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "b")))
        res = frontier.insert("o2", enc(profile, ("a", "b")))
        assert res.is_pareto and res.removed == []
        assert set(frontier.ids) == {"o1", "o2"}

    def test_incomparable_objects_accumulate(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "c")))
        frontier.insert("o2", enc(profile, ("c", "a")))
        assert len(frontier) == 2

    def test_n_compared_counts_full_frontier(self, profile, frontier):
        for i, v in enumerate([("a", "c"), ("c", "a"), ("b", "b")]):
            frontier.insert(f"o{i}", enc(profile, v))
        res = frontier.insert("ox", enc(profile, ("a", "a")))
        assert res.n_compared == 3


class TestMaintenance:
    def test_discard_present(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "a")))
        assert frontier.discard("o1") is True
        assert len(frontier) == 0

    def test_discard_absent(self, profile, frontier):
        assert frontier.discard("nope") is False

    def test_contains(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "a")))
        assert "o1" in frontier and "o2" not in frontier

    def test_dominated_by_frontier_readonly(self, profile, frontier):
        frontier.insert("o1", enc(profile, ("a", "a")))
        dominated, n = frontier.dominated_by_frontier(enc(profile, ("b", "b")))
        assert dominated and n == 1
        assert frontier.ids == ["o1"]  # unchanged

    def test_add_unchecked(self, profile, frontier):
        frontier.add_unchecked("o1", enc(profile, ("c", "c")))
        assert frontier.ids == ["o1"]

    def test_matrix_shape(self, profile, frontier):
        assert frontier.matrix().shape == (0, 2)
        frontier.insert("o1", enc(profile, ("a", "a")))
        assert frontier.matrix().shape == (1, 2)
        assert frontier.matrix().dtype == np.int32

"""Preference derivation rules (Sec. VIII-A) — pandas reference."""
import pandas as pd
import pytest

from repro.datasets.derive import fill_missing_attrs, prefs_from_stats, stats_from_ratings
from repro.posets.poset import Poset


def _stats(rows):
    return pd.DataFrame(rows, columns=["user_id", "attr", "value", "s1", "s2"])


class TestProductOrderRule:
    def test_strict_on_both(self):
        prefs = prefs_from_stats(
            _stats([("u", "d", "a", 4.0, 10), ("u", "d", "b", 3.0, 5)]), {"d": ["a", "b"]}
        )
        assert prefs["u"]["d"].prefers("a", "b")
        assert not prefs["u"]["d"].prefers("b", "a")

    def test_tie_on_s1_strict_on_s2(self):
        prefs = prefs_from_stats(
            _stats([("u", "d", "a", 4.0, 10), ("u", "d", "b", 4.0, 5)]), {"d": ["a", "b"]}
        )
        assert prefs["u"]["d"].prefers("a", "b")

    def test_tie_on_both_incomparable(self):
        prefs = prefs_from_stats(
            _stats([("u", "d", "a", 4.0, 10), ("u", "d", "b", 4.0, 10)]), {"d": ["a", "b"]}
        )
        assert len(prefs["u"]["d"].pairs) == 0

    def test_conflicting_stats_incomparable(self):
        # higher rating but lower count: neither dominates (the paper's
        # "and vice versa" rule).
        prefs = prefs_from_stats(
            _stats([("u", "d", "a", 4.5, 3), ("u", "d", "b", 3.0, 20)]), {"d": ["a", "b"]}
        )
        assert len(prefs["u"]["d"].pairs) == 0

    def test_resulting_relation_is_transitive_poset(self):
        prefs = prefs_from_stats(
            _stats(
                [
                    ("u", "d", "a", 5.0, 30),
                    ("u", "d", "b", 4.0, 20),
                    ("u", "d", "c", 3.0, 10),
                ]
            ),
            {"d": ["a", "b", "c"]},
        )
        p = prefs["u"]["d"]
        assert p.prefers("a", "c")  # via closure of the product order
        assert len(p.pairs) == 3

    def test_multiple_users_and_attrs_grouped_independently(self):
        prefs = prefs_from_stats(
            _stats(
                [
                    ("u1", "d1", "a", 4.0, 10),
                    ("u1", "d1", "b", 3.0, 5),
                    ("u2", "d1", "a", 2.0, 1),
                    ("u2", "d1", "b", 3.0, 5),
                    ("u1", "d2", "x", 1.0, 1),
                ]
            ),
            {"d1": ["a", "b"], "d2": ["x"]},
        )
        assert prefs["u1"]["d1"].prefers("a", "b")
        assert prefs["u2"]["d1"].prefers("b", "a")
        assert len(prefs["u1"]["d2"].pairs) == 0

    def test_fill_missing_attrs(self):
        prefs = {"u": {"d1": Poset([("a", "b")])}}
        out = fill_missing_attrs(prefs, ["d1", "d2"], {"d1": ["a", "b"], "d2": ["x"]})
        assert len(out["u"]["d2"].pairs) == 0
        assert out["u"]["d2"].domain == {"x"}


class TestStatsFromRatings:
    def test_avg_and_count(self):
        ratings = pd.DataFrame(
            {
                "user_id": ["u", "u", "u"],
                "obj_id": ["m1", "m2", "m3"],
                "rating": [5, 3, 4],
            }
        )
        objects = pd.DataFrame(
            {"obj_id": ["m1", "m2", "m3"], "genre": ["g1", "g1", "g2"]}
        )
        stats = stats_from_ratings(ratings, objects, ["genre"])
        g1 = stats[stats.value == "g1"].iloc[0]
        assert g1.s1 == pytest.approx(4.0)
        assert g1.s2 == 2
        g2 = stats[stats.value == "g2"].iloc[0]
        assert (g2.s1, g2.s2) == (4.0, 1)

    def test_multi_attr_melt(self):
        ratings = pd.DataFrame(
            {"user_id": ["u"], "obj_id": ["m1"], "rating": [5]}
        )
        objects = pd.DataFrame(
            {"obj_id": ["m1"], "genre": ["g"], "actor": ["a"]}
        )
        stats = stats_from_ratings(ratings, objects, ["genre", "actor"])
        assert set(stats["attr"]) == {"genre", "actor"}
        assert len(stats) == 2

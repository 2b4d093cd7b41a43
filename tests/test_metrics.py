"""Efficacy metrics (Eqs. 7-9)."""
import pytest

from repro.core.metrics import accuracy, efficacy


class TestEfficacy:
    def test_perfect(self):
        e = efficacy({("c", "o1"), ("c", "o2")}, {("c", "o1"), ("c", "o2")})
        assert (e.precision, e.recall, e.f_measure) == (1.0, 1.0, 1.0)
        assert (e.true_pos, e.false_pos, e.false_neg) == (2, 0, 0)

    def test_false_negatives_hit_recall_only(self):
        e = efficacy({("c", "o1")}, {("c", "o1"), ("c", "o2")})
        assert e.precision == 1.0
        assert e.recall == 0.5
        assert e.f_measure == pytest.approx(2 / 3)
        assert e.false_neg == 1

    def test_false_positives_hit_precision_only(self):
        e = efficacy({("c", "o1"), ("c", "o2")}, {("c", "o1")})
        assert e.precision == 0.5
        assert e.recall == 1.0
        assert e.false_pos == 1

    def test_disjoint(self):
        e = efficacy({("c", "a")}, {("c", "b")})
        assert (e.precision, e.recall, e.f_measure) == (0.0, 0.0, 0.0)

    def test_both_empty_is_perfect(self):
        e = efficacy(set(), set())
        assert (e.precision, e.recall, e.f_measure) == (1.0, 1.0, 1.0)

    def test_empty_approx_nonempty_exact(self):
        e = efficacy(set(), {("c", "o")})
        assert e.precision == 1.0 and e.recall == 0.0

    def test_as_percent(self):
        e = efficacy({("c", "o1")}, {("c", "o1"), ("c", "o2")})
        p, r, f = e.as_percent()
        assert (p, r) == (100.0, 50.0)
        assert f == pytest.approx(100 * 2 / 3)


class TestAccuracy:
    def test_eq9(self):
        # 10 total pairs: 1 TP, 1 FN, 1 FP, 7 TN -> 0.8.
        a = {("c", "o1"), ("c", "o3")}
        e = {("c", "o1"), ("c", "o2")}
        assert accuracy(a, e, total_pairs=10) == pytest.approx(0.8)

    def test_perfect(self):
        s = {("c", "o1")}
        assert accuracy(s, s, total_pairs=5) == 1.0

    def test_invalid_total(self):
        with pytest.raises(ValueError):
            accuracy(set(), set(), total_pairs=0)

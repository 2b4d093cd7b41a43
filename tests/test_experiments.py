"""Experiment harnesses (Tables XI/XII, timing) at smoke scale: schema,
internal exact-vs-baseline consistency, and the paper's qualitative
shapes (precision ≈ 100 ≥ recall; FTV does less work than Baseline)."""
import pytest

from repro.experiments import table11, table12, timing
from repro.experiments.harness import (
    build_dendrogram,
    clusters_for,
    run_baseline,
    run_ftv,
    score,
)
from repro.experiments.table11 import make_dataset


@pytest.fixture(scope="module")
def t11_rows():
    return table11.run("movie", n_users=18, n_groups=3, n_stream=400, h_values=(0.7, 0.55))


@pytest.fixture(scope="module")
def t12_rows():
    return table12.run(
        "movie",
        n_users=12,
        n_groups=3,
        n_stream=400,
        w_values=(100, 200),
        h_values=(0.7, 0.55),
    )


class TestTable11Harness:
    def test_row_schema(self, t11_rows):
        assert [(r.dataset, r.h) for r in t11_rows] == [
            ("movie", 0.7),
            ("movie", 0.55),
        ]

    def test_precision_dominates_recall(self, t11_rows):
        # The paper's key efficacy shape: losses are false negatives.
        for r in t11_rows:
            assert r.efficacy.precision >= r.efficacy.recall - 1e-9
            assert r.efficacy.precision > 0.9
            assert 0.5 < r.efficacy.recall <= 1.0

    def test_approx_does_less_work_than_exact_than_baseline(self, t11_rows):
        for r in t11_rows:
            assert r.approx_comparisons < r.exact_comparisons < r.baseline_comparisons

    def test_lower_h_fewer_clusters(self, t11_rows):
        assert t11_rows[1].n_clusters <= t11_rows[0].n_clusters

    def test_markdown_contains_paper_numbers(self, t11_rows):
        md = table11.to_markdown(t11_rows)
        assert "95.10" in md  # paper's movie recall at h=0.70
        assert md.count("|") > 10

    def test_unknown_dataset_rejected(self):
        with pytest.raises(ValueError):
            make_dataset("imdb", n_users=4, n_groups=2, n_stream=10)


class TestTable12Harness:
    def test_row_schema(self, t12_rows):
        assert [(r.window, r.h) for r in t12_rows] == [
            (100, 0.7),
            (100, 0.55),
            (200, 0.7),
            (200, 0.55),
        ]

    def test_precision_dominates_recall(self, t12_rows):
        for r in t12_rows:
            assert r.efficacy.precision >= r.efficacy.recall - 1e-9
            assert r.efficacy.precision > 0.9

    def test_approx_cheaper_than_baseline(self, t12_rows):
        for r in t12_rows:
            assert r.approx_comparisons < r.baseline_comparisons

    def test_markdown_renders(self, t12_rows):
        md = table12.to_markdown(t12_rows)
        assert "| movie | 100 | 0.70 |" in md


class TestTimingHarness:
    def test_static_rows(self):
        rows = timing.run(
            "movie",
            n_users=12,
            n_groups=3,
            n_values=(100, 200),
            d_values=(2,),
            h=0.55,
        )
        algos = {r.algorithm for r in rows}
        assert algos == {"Baseline", "FilterThenVerifyExact", "FilterThenVerifyApprox"}
        # n sweep at d=4 plus one d=2 sweep
        assert {(r.n, r.d) for r in rows} == {(100, 4), (200, 4), (100, 2)}
        md = timing.to_markdown(rows)
        assert "Baseline" in md and "x |" in md

    def test_sliding_rows(self):
        rows = timing.run(
            "movie",
            n_users=10,
            n_groups=2,
            n_values=(200,),
            d_values=(4,),
            w_values=(50, 100),
            sliding=True,
        )
        assert {r.window for r in rows} == {50, 100}
        assert {r.algorithm for r in rows} == {
            "BaselineSW",
            "FilterThenVerifyExactSW",
            "FilterThenVerifyApproxSW",
        }

    def test_comparisons_grow_with_n(self):
        rows = timing.run(
            "movie", n_users=10, n_groups=2, n_values=(100, 300), d_values=(4,)
        )
        base = {r.n: r.comparisons for r in rows if r.algorithm == "Baseline"}
        assert base[300] > base[100]


class TestHarnessInternals:
    def test_exact_equals_baseline_at_any_h(self):
        ds = make_dataset("publication", n_users=10, n_groups=2, n_stream=200)
        dend = build_dendrogram(ds)
        base = run_baseline(ds)
        for h in (0.9, 0.6, 0.3):
            ex = run_ftv(
                ds, clusters_for(ds, dend, h, approximate=False), approximate=False, h=h
            )
            assert ex.disseminated == base.disseminated, h

    def test_threshold2_one_makes_approx_exact(self):
        # With threshold2=1.0 the approximate relation degenerates to the
        # common relation, so the approx run must be lossless.
        ds = make_dataset("movie", n_users=8, n_groups=2, n_stream=150)
        dend = build_dendrogram(ds)
        base = run_baseline(ds)
        ap = run_ftv(
            ds,
            clusters_for(ds, dend, 0.55, approximate=True, threshold2=1.0),
            approximate=True,
            h=0.55,
        )
        e = score(ap, base)
        assert (e.precision, e.recall) == (1.0, 1.0)

    def test_windowed_run_result_fields(self):
        ds = make_dataset("movie", n_users=6, n_groups=2, n_stream=100)
        res = run_baseline(ds, window=30)
        assert res.algorithm == "BaselineSW"
        assert res.window == 30
        assert res.comparisons > 0

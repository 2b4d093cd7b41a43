"""Benchmark: Figs. 6-9 as numbers — append-only Baseline vs
FilterThenVerifyExact vs FilterThenVerifyApprox (cumulative time and
comparisons), per dataset and per algorithm so the pytest-benchmark table
itself shows the ordering the paper's figures show."""
import pytest

from repro.experiments.harness import build_dendrogram, clusters_for, run_baseline, run_ftv
from repro.experiments.table11 import make_dataset

SCALE = dict(n_users=36, n_groups=4, n_stream=1500)
H = 0.55
_cache = {}


def _setup(dataset):
    if dataset not in _cache:
        ds = make_dataset(dataset, **SCALE)
        dend = build_dendrogram(ds)
        _cache[dataset] = (
            ds,
            clusters_for(ds, dend, H, approximate=False),
            clusters_for(ds, dend, H, approximate=True),
        )
    return _cache[dataset]


@pytest.mark.parametrize("dataset", ["movie", "publication"])
class TestStaticTiming:
    def test_baseline(self, benchmark, dataset):
        ds, _, _ = _setup(dataset)
        res = benchmark.pedantic(lambda: run_baseline(ds), rounds=1, iterations=1)
        assert res.comparisons > 0

    def test_filter_then_verify_exact(self, benchmark, dataset):
        ds, exact, _ = _setup(dataset)
        res = benchmark.pedantic(
            lambda: run_ftv(ds, exact, approximate=False, h=H), rounds=1, iterations=1
        )
        assert res.comparisons > 0

    def test_filter_then_verify_approx(self, benchmark, dataset):
        ds, _, approx = _setup(dataset)
        res = benchmark.pedantic(
            lambda: run_ftv(ds, approx, approximate=True, h=H), rounds=1, iterations=1
        )
        assert res.comparisons > 0

    def test_ordering_matches_paper(self, dataset, benchmark):
        """Work done: Baseline > FTVExact > FTVApprox (Figs. 6b/7b)."""
        ds, exact, approx = _setup(dataset)

        def check():
            b = run_baseline(ds)
            e = run_ftv(ds, exact, approximate=False, h=H)
            a = run_ftv(ds, approx, approximate=True, h=H)
            assert a.comparisons < e.comparisons < b.comparisons
            assert e.disseminated == b.disseminated
            return b.comparisons / a.comparisons

        ratio = benchmark.pedantic(check, rounds=1, iterations=1)
        assert ratio > 1.5

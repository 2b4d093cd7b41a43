"""Benchmark: regenerate Table XI (efficacy of FilterThenVerifyApprox,
varying h) at reduced scale, per dataset. One pedantic round — the
benchmark measures the full table pipeline (HAC + 1 Baseline + per-h
exact and approx runs); the printed rows go to EXPERIMENTS.md via
jobs/run_table11.py at the larger documented scale."""
import pytest

from repro.experiments import table11

SCALE = dict(n_users=36, n_groups=4, n_stream=1200, h_values=(0.70, 0.55))


@pytest.mark.parametrize("dataset", ["movie", "publication"])
def test_table11(benchmark, dataset):
    rows = benchmark.pedantic(
        lambda: table11.run(dataset, **SCALE), rounds=1, iterations=1
    )
    assert len(rows) == len(SCALE["h_values"])
    for r in rows:
        # Table XI shape: precision ~100%, recall below it.
        assert r.efficacy.precision > 0.9
    # The work win requires clusters of non-trivial size; at high h the
    # cut can be near-singletons where the filter stage only adds overhead
    # (the k-vs-m tradeoff of Sec. IV). Assert at the lowest h.
    assert rows[-1].approx_comparisons < rows[-1].baseline_comparisons

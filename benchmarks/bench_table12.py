"""Benchmark: regenerate Table XII (efficacy of FilterThenVerifyApproxSW
over sliding windows, varying W and h) at reduced scale, per dataset."""
import pytest

from repro.experiments import table12

SCALE = dict(
    n_users=24,
    n_groups=4,
    n_stream=1500,
    w_values=(400, 800),
    h_values=(0.70, 0.55),
)


@pytest.mark.parametrize("dataset", ["movie", "publication"])
def test_table12(benchmark, dataset):
    rows = benchmark.pedantic(
        lambda: table12.run(dataset, **SCALE), rounds=1, iterations=1
    )
    assert len(rows) == len(SCALE["w_values"]) * len(SCALE["h_values"])
    for r in rows:
        assert r.efficacy.precision > 0.9
    # As in bench_table11: the work win is asserted at the lowest h (big
    # clusters); near-singleton cuts only add filter overhead (Sec. IV's
    # k-vs-m tradeoff).
    lowest_h = min(SCALE["h_values"])
    for r in rows:
        if r.h == lowest_h:
            assert r.approx_comparisons < r.baseline_comparisons

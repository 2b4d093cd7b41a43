"""Efficacy metrics for the approximate solutions (Eqs. 7-9).

The paper aggregates over users: ``precision = Σ_c |P_ac ∩ P_c| / Σ_c
|P_ac|`` and ``recall = Σ_c |P_ac ∩ P_c| / Σ_c |P_c|``. In the continuous
setting the per-user sets we score are the accumulated *disseminations* —
the (user, object) pairs for which the algorithm declared the object
Pareto-optimal during its lifetime (at arrival, or at a mend-time
promotion in the sliding-window engines). This is exactly the quantity
``C_o`` the problem statement asks for.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Hashable, Iterable

Pairs = set[tuple[Hashable, Hashable]]  #: {(user, object)}


@dataclass(frozen=True)
class Efficacy:
    precision: float
    recall: float
    f_measure: float
    true_pos: int
    false_pos: int
    false_neg: int

    def as_percent(self) -> tuple[float, float, float]:
        return (100 * self.precision, 100 * self.recall, 100 * self.f_measure)


def accuracy(
    approx: Iterable[tuple], exact: Iterable[tuple], *, total_pairs: int
) -> float:
    """Eq. 9: (TP + TN) / all — needs the size of the full (user, object)
    space to count true negatives. Reported for completeness; the paper's
    tables only show precision/recall/F."""
    a, e = set(approx), set(exact)
    tp = len(a & e)
    fp = len(a - e)
    fn = len(e - a)
    tn = total_pairs - tp - fp - fn
    if total_pairs <= 0:
        raise ValueError("total_pairs must be positive")
    return (tp + tn) / total_pairs


def efficacy(approx: Iterable[tuple], exact: Iterable[tuple]) -> Efficacy:
    """Precision/recall/F of approximate dissemination pairs vs exact."""
    a, e = set(approx), set(exact)
    tp = len(a & e)
    precision = tp / len(a) if a else 1.0
    recall = tp / len(e) if e else 1.0
    f = (
        2 * precision * recall / (precision + recall)
        if (precision + recall) > 0
        else 0.0
    )
    return Efficacy(precision, recall, f, tp, len(a) - tp, len(e) - tp)

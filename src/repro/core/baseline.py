"""Algorithm 1 — ``Baseline``: per-user incremental Pareto maintenance.

Upon each arriving object, every user's frontier is updated independently
(the basic skyline insertion of [2]); the returned target users are the
users whose frontier admitted the object.
"""
from __future__ import annotations

from typing import Hashable, Mapping, Sequence

from repro.core.common import UserPrefs
from repro.core.dominance import ComparisonCounter, ObjectValues, Profile
from repro.core.frontier import Frontier

UserId = Hashable
ObjectId = Hashable


class BaselineEngine:
    """One frontier per user; no sharing (the paper's Baseline)."""

    def __init__(
        self,
        attrs: Sequence[str],
        prefs_by_user: Mapping[UserId, UserPrefs],
        domains: Mapping[str, Sequence],
    ):
        self.attrs = tuple(attrs)
        self.profiles: dict[UserId, Profile] = {
            c: Profile(attrs, prefs, domains) for c, prefs in prefs_by_user.items()
        }
        self.frontiers: dict[UserId, Frontier] = {
            c: Frontier(p) for c, p in self.profiles.items()
        }
        # All profiles share `domains`, so dictionary encodings coincide:
        # encode each arriving object once and reuse the vector everywhere.
        self._encoder = next(iter(self.profiles.values()), None)
        self.counter = ComparisonCounter()

    def insert(self, oid: ObjectId, obj: ObjectValues) -> set[UserId]:
        """Process one arrival; returns the target users ``C_o``."""
        targets: set[UserId] = set()
        x = self._encoder.encode(obj)
        for c, frontier in self.frontiers.items():
            res = frontier.insert(oid, x)
            self.counter.add("user", res.n_compared)
            if res.is_pareto:
                targets.add(c)
        return targets

    def frontier_of(self, c: UserId) -> set[ObjectId]:
        return set(self.frontiers[c].ids)

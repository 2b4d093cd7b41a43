"""Algorithm 2 — ``FilterThenVerify`` (exact and approximate).

Per cluster ``U`` a frontier ``P_U`` under the cluster relation (common
relation ``≻_U`` for the exact variant, approximate relation ``≻_aU`` for
FilterThenVerifyApprox) acts as a sieve:

* objects dominated w.r.t. ``≻_U`` are true negatives for every member
  (Thm. 2 / Thm. 3) and are dropped without any per-user work;
* objects the new arrival dominates w.r.t. ``≻_U`` are evicted from
  ``P_U`` *and* from every member frontier containing them (case I of
  ``updateParetoFrontierU``) — one cluster-level comparison replaces up to
  ``|U|`` per-user comparisons;
* survivors are verified per member with the member's own preferences
  (Alg. 1's ``updateParetoFrontier``).
"""
from __future__ import annotations

from typing import Hashable, Mapping, Sequence

from repro.core.common import Cluster, UserPrefs
from repro.core.dominance import ComparisonCounter, ObjectValues, Profile
from repro.core.frontier import Frontier

UserId = Hashable
ObjectId = Hashable


class FTVEngine:
    """Filter-then-verify over a fixed clustering of the users."""

    def __init__(
        self,
        attrs: Sequence[str],
        clusters: Sequence[Cluster],
        prefs_by_user: Mapping[UserId, UserPrefs],
        domains: Mapping[str, Sequence],
    ):
        self.attrs = tuple(attrs)
        self.clusters = list(clusters)
        seen: set[UserId] = set()
        for cl in self.clusters:
            for c in cl.members:
                if c in seen:
                    raise ValueError(f"user {c!r} appears in more than one cluster")
                seen.add(c)
        self.cluster_profiles: dict[Hashable, Profile] = {
            cl.cluster_id: Profile(attrs, cl.relation, domains) for cl in self.clusters
        }
        self.cluster_frontiers: dict[Hashable, Frontier] = {
            cid: Frontier(p) for cid, p in self.cluster_profiles.items()
        }
        self.user_profiles: dict[UserId, Profile] = {
            c: Profile(attrs, prefs_by_user[c], domains)
            for cl in self.clusters
            for c in cl.members
        }
        self.user_frontiers: dict[UserId, Frontier] = {
            c: Frontier(p) for c, p in self.user_profiles.items()
        }
        # All profiles share `domains`, so dictionary encodings coincide:
        # encode each arriving object once and reuse the vector everywhere.
        self._encoder = next(iter(self.cluster_profiles.values()), None)
        self.counter = ComparisonCounter()

    def insert(self, oid: ObjectId, obj: ObjectValues) -> set[UserId]:
        """Process one arrival; returns the (approximate) target users."""
        targets: set[UserId] = set()
        x = self._encoder.encode(obj)
        for cl in self.clusters:
            cid = cl.cluster_id
            res = self.cluster_frontiers[cid].insert(oid, x)
            self.counter.add("cluster", res.n_compared)
            if not res.is_pareto:
                continue  # true negative for every member (Thm. 2)
            for gone in res.removed:
                # o' left P_U, so it leaves every member frontier too
                # (case I; id removal, no comparisons).
                for c in cl.members:
                    self.user_frontiers[c].discard(gone)
            for c in cl.members:
                r = self.user_frontiers[c].insert(oid, x)
                self.counter.add("user", r.n_compared)
                if r.is_pareto:
                    targets.add(c)
        return targets

    def cluster_frontier_of(self, cid: Hashable) -> set[ObjectId]:
        return set(self.cluster_frontiers[cid].ids)

    def frontier_of(self, c: UserId) -> set[ObjectId]:
        return set(self.user_frontiers[c].ids)

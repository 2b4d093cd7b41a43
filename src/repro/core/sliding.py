"""Algorithms 4-5 — ``BaselineSW`` / ``FilterThenVerifySW``.

Count-based sliding window of the ``W`` most recent objects: when object
``o_in`` with timestamp ``in`` arrives, the object with timestamp
``in - W`` expires first, then ``o_in`` is processed (Sec. VII).

Both engines keep *Pareto frontier buffers* (Def. 10): the recent objects
not dominated by any *later* object. By Thm. 5 an object dominated by a
later arrival can never re-enter any frontier, so buffers shrink
aggressively; BaselineSW keeps one buffer per user, FilterThenVerifySW a
single buffer per cluster (Thm. 6).

Expiry handling in FilterThenVerifySW extends the paper's pseudocode with
a per-member mend pass over ``P_U`` (members whose ``P_c`` contained
``o_out`` may owe promotions for objects that were dominated by ``o_out``
only under their own preferences, not under ``≻_U``) — without it ``P_c``
drifts from the Def. 9 frontier; see DESIGN.md §4.

Dissemination accounting: ``C_o`` grows both at arrival time and when a
mend promotes an object into some ``P_c`` mid-lifetime (the paper's
``mendParetoFrontierSW`` does ``C_o ← C_o ∪ {c}``). Engines accumulate
all such (user, object) pairs in ``disseminated``.
"""
from __future__ import annotations

from typing import Hashable, Mapping, Sequence

import numpy as np

from repro.core.common import Cluster, UserPrefs
from repro.core.dominance import ComparisonCounter, ObjectValues, Profile
from repro.core.frontier import Frontier

UserId = Hashable
ObjectId = Hashable


class _Buffer:
    """Pareto frontier buffer (Def. 10) with arrival timestamps."""

    def __init__(self, profile: Profile):
        self.profile = profile
        self.ids: list[ObjectId] = []
        self.ts: list[int] = []
        self._rows: list[np.ndarray] = []

    def __len__(self) -> int:
        return len(self.ids)

    def matrix(self) -> np.ndarray:
        if not self._rows:
            return np.zeros((0, self.profile.n_attrs), dtype=np.int32)
        return np.vstack(self._rows)

    def add(self, oid: ObjectId, t: int, x: np.ndarray) -> None:
        self.ids.append(oid)
        self.ts.append(t)
        self._rows.append(x)

    def discard(self, oid: ObjectId) -> None:
        try:
            i = self.ids.index(oid)
        except ValueError:
            return
        del self.ids[i]
        del self.ts[i]
        del self._rows[i]

    def refresh(self, oid: ObjectId, t: int, x: np.ndarray) -> int:
        """``refreshParetoBufferSW``: drop members the newcomer dominates
        (they precede it, so by Thm. 5 they are done), then append it.
        Returns the number of comparisons performed."""
        masks = self.profile.compare(self.matrix(), x)
        doomed = set(np.flatnonzero(masks.dominates).tolist())
        if doomed:
            keep = [i for i in range(len(self.ids)) if i not in doomed]
            self.ids = [self.ids[i] for i in keep]
            self.ts = [self.ts[i] for i in keep]
            self._rows = [self._rows[i] for i in keep]
        self.add(oid, t, x)
        return masks.n_compared

    def dominated_by(self, x_out: np.ndarray) -> list[tuple[ObjectId, int, np.ndarray]]:
        """Members strictly dominated by the expiring object's encoding."""
        masks = self.profile.compare(self.matrix(), x_out)
        idx = np.flatnonzero(masks.dominates)
        return [(self.ids[i], self.ts[i], self._rows[i]) for i in idx]


class BaselineSWEngine:
    """Alg. 4: per-user frontier + per-user Pareto buffer."""

    def __init__(
        self,
        attrs: Sequence[str],
        prefs_by_user: Mapping[UserId, UserPrefs],
        domains: Mapping[str, Sequence],
        window: int,
    ):
        self.window = window
        self.profiles = {c: Profile(attrs, p, domains) for c, p in prefs_by_user.items()}
        self.frontiers = {c: Frontier(p) for c, p in self.profiles.items()}
        self.buffers = {c: _Buffer(p) for c, p in self.profiles.items()}
        # All profiles share `domains`, so dictionary encodings coincide:
        # encode each object once and reuse the vector everywhere.
        self._encoder = next(iter(self.profiles.values()), None)
        self._history: dict[int, tuple[ObjectId, ObjectValues]] = {}
        self.t = 0
        self.counter = ComparisonCounter()
        self.disseminated: set[tuple[UserId, ObjectId]] = set()

    def insert(self, oid: ObjectId, obj: ObjectValues) -> set[UserId]:
        self.t += 1
        t_out = self.t - self.window
        if t_out >= 1:
            out_id, out_obj = self._history.pop(t_out)
            self._expire(out_id, out_obj)
        self._history[self.t] = (oid, obj)
        targets: set[UserId] = set()
        x = self._encoder.encode(obj)
        for c, fr in self.frontiers.items():
            res = fr.insert(oid, x)
            self.counter.add("user", res.n_compared)
            if res.is_pareto:
                targets.add(c)
                self.disseminated.add((c, oid))
            self.counter.add("buffer", self.buffers[c].refresh(oid, self.t, x))
        return targets

    def _expire(self, out_id: ObjectId, out_obj: ObjectValues) -> None:
        x_out = self._encoder.encode(out_obj)
        for c, fr in self.frontiers.items():
            buf = self.buffers[c]
            if fr.discard(out_id):
                # Objects exclusively dominated by o_out may now be Pareto.
                candidates = buf.dominated_by(x_out)
                self.counter.add("buffer", len(buf))
                for cand_id, _, cand_x in sorted(candidates, key=lambda r: r[1]):
                    dominated, n = fr.dominated_by_frontier(cand_x)
                    self.counter.add("user", n)
                    if not dominated:
                        fr.add_unchecked(cand_id, cand_x)
                        self.disseminated.add((c, cand_id))
            buf.discard(out_id)

    def frontier_of(self, c: UserId) -> set[ObjectId]:
        return set(self.frontiers[c].ids)

    def buffer_of(self, c: UserId) -> set[ObjectId]:
        return set(self.buffers[c].ids)


class FTVSWEngine:
    """Alg. 5: cluster-level frontier + single buffer per cluster.

    Works for both the exact variant (clusters carry ``≻_U``) and the
    approximate one (clusters carry ``≻_aU``).
    """

    def __init__(
        self,
        attrs: Sequence[str],
        clusters: Sequence[Cluster],
        prefs_by_user: Mapping[UserId, UserPrefs],
        domains: Mapping[str, Sequence],
        window: int,
    ):
        self.window = window
        self.clusters = list(clusters)
        self.cluster_profiles = {
            cl.cluster_id: Profile(attrs, cl.relation, domains) for cl in self.clusters
        }
        self.cluster_frontiers = {
            cid: Frontier(p) for cid, p in self.cluster_profiles.items()
        }
        self.cluster_buffers = {cid: _Buffer(p) for cid, p in self.cluster_profiles.items()}
        self.user_profiles = {
            c: Profile(attrs, prefs_by_user[c], domains)
            for cl in self.clusters
            for c in cl.members
        }
        self.user_frontiers = {c: Frontier(p) for c, p in self.user_profiles.items()}
        # All profiles share `domains`, so dictionary encodings coincide:
        # encode each object once; cluster- and user-level frontiers hold
        # the very same int vectors.
        self._encoder = next(iter(self.cluster_profiles.values()), None)
        self._history: dict[int, tuple[ObjectId, ObjectValues]] = {}
        self.t = 0
        self.counter = ComparisonCounter()
        self.disseminated: set[tuple[UserId, ObjectId]] = set()

    def insert(self, oid: ObjectId, obj: ObjectValues) -> set[UserId]:
        self.t += 1
        t_out = self.t - self.window
        if t_out >= 1:
            out_id, out_obj = self._history.pop(t_out)
            self._expire(out_id, out_obj)
        self._history[self.t] = (oid, obj)
        targets: set[UserId] = set()
        x = self._encoder.encode(obj)
        for cl in self.clusters:
            cid = cl.cluster_id
            res = self.cluster_frontiers[cid].insert(oid, x)
            self.counter.add("cluster", res.n_compared)
            if res.is_pareto:
                for gone in res.removed:
                    for c in cl.members:
                        self.user_frontiers[c].discard(gone)
                for c in cl.members:
                    r = self.user_frontiers[c].insert(oid, x)
                    self.counter.add("user", r.n_compared)
                    if r.is_pareto:
                        targets.add(c)
                        self.disseminated.add((c, oid))
            self.counter.add("buffer", self.cluster_buffers[cid].refresh(oid, self.t, x))
        return targets

    def _expire(self, out_id: ObjectId, out_obj: ObjectValues) -> None:
        x_out = self._encoder.encode(out_obj)
        for cl in self.clusters:
            cid = cl.cluster_id
            fr_u = self.cluster_frontiers[cid]
            buf = self.cluster_buffers[cid]
            if fr_u.discard(out_id):
                # Cluster-level mend: buffer objects dominated only by
                # o_out (w.r.t. ≻_U) may enter P_U.
                candidates = buf.dominated_by(x_out)
                self.counter.add("buffer", len(buf))
                for cand_id, _, cand_x in sorted(candidates, key=lambda r: r[1]):
                    dominated, n = fr_u.dominated_by_frontier(cand_x)
                    self.counter.add("cluster", n)
                    if not dominated:
                        fr_u.add_unchecked(cand_id, cand_x)
                # Per-member mend (see module docstring): members whose
                # P_c contained o_out re-check P_U members dominated by
                # o_out under their own preferences. A candidate must be
                # verified against *all* of P_U under ≻_c (Lemma 1), not
                # just the current P_c — its c-dominator may itself be a
                # not-yet-promoted candidate.
                pu_ids = list(fr_u.ids)
                pu_rows = fr_u.matrix()
                for c in cl.members:
                    fr_c = self.user_frontiers[c]
                    if not fr_c.discard(out_id):
                        continue
                    p = self.user_profiles[c]
                    out_dom = p.compare(pu_rows, x_out)
                    self.counter.add("user", out_dom.n_compared)
                    in_pc = set(fr_c.ids)
                    for i in np.flatnonzero(out_dom.dominates):
                        pu_id = pu_ids[i]
                        if pu_id in in_pc:
                            continue
                        x_c = pu_rows[i]
                        mm = p.compare(pu_rows, x_c)
                        self.counter.add("user", mm.n_compared)
                        if not mm.dominated_by.any():
                            fr_c.add_unchecked(pu_id, x_c)
                            self.disseminated.add((c, pu_id))
            else:
                # o_out ∉ P_U ⟹ o_out ∉ any member frontier (P_c ⊆ P_U).
                pass
            buf.discard(out_id)

    def cluster_frontier_of(self, cid: Hashable) -> set[ObjectId]:
        return set(self.cluster_frontiers[cid].ids)

    def cluster_buffer_of(self, cid: Hashable) -> set[ObjectId]:
        return set(self.cluster_buffers[cid].ids)

    def frontier_of(self, c: UserId) -> set[ObjectId]:
        return set(self.user_frontiers[c].ids)

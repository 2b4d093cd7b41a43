"""Common preference relations of user clusters (Def. 5, Thm. 1)."""
from __future__ import annotations

from dataclasses import dataclass
from typing import Hashable, Mapping, Sequence

from repro.posets.poset import Poset, common_relation

UserId = Hashable
UserPrefs = Mapping[str, Poset]  #: attr -> strict partial order


@dataclass(frozen=True)
class Cluster:
    """A set of users plus the relation its virtual user filters with.

    ``relation`` is the common preference relation ``≻_U`` for the exact
    algorithms or the approximate common relation ``≻_aU`` (Def. 8) for
    the approximate ones.
    """

    cluster_id: Hashable
    members: tuple[UserId, ...]
    relation: Mapping[str, Poset]


def cluster_common_relation(
    members: Sequence[UserId], prefs_by_user: Mapping[UserId, UserPrefs], attrs: Sequence[str]
) -> dict[str, Poset]:
    """``≻_U^d = ∩_{c∈U} ≻_c^d`` for every attribute d."""
    return {d: common_relation(prefs_by_user[c][d] for c in members) for d in attrs}


def make_exact_clusters(
    partition: Sequence[Sequence[UserId]],
    prefs_by_user: Mapping[UserId, UserPrefs],
    attrs: Sequence[str],
) -> list[Cluster]:
    """Build :class:`Cluster` objects with exact common relations."""
    return [
        Cluster(i, tuple(members), cluster_common_relation(members, prefs_by_user, attrs))
        for i, members in enumerate(partition)
    ]

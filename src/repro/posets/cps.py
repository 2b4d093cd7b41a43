"""CPS (Chain-Product decomposition Skyline) embedding [Zhang et al., 32].

The paper implements poset manipulation by embedding each strict partial
order into a product of chains so that dominance between attribute values
becomes numeric coordinate-wise comparison (and any numeric skyline
algorithm applies). We reproduce that substrate:

* :func:`chain_decomposition` — greedy longest-chain cover of the poset's
  domain (values incomparable to everything become singleton chains).
* :func:`cps_embedding` — the order embedding ``f_i(v) = |{u ∈ C_i :
  u ⪯ v}|``. For any chain cover this satisfies::

      v ⪯ w  ⟺  f_i(v) ≤ f_i(w) for every chain i

  (⇒ by monotonicity of down-set counts; ⇐ because the chain containing
  ``v`` pins it down: the f-value forces ``v ⪯ w`` through that chain).
  Equal vectors ⟺ equal values, so strict preference is exactly
  "≤ everywhere and ≠ somewhere" — numeric skyline semantics.
"""
from __future__ import annotations

from typing import Hashable, Sequence

from repro.posets.poset import Poset

Value = Hashable


def chain_decomposition(poset: Poset) -> list[list[Value]]:
    """Cover ``poset.domain`` with disjoint chains (best-first greedy).

    Repeatedly extracts the longest chain (top-to-bottom path in the
    restriction of the order to the remaining values) until every value is
    covered. Greedy does not always reach Dilworth's optimum number of
    chains, but optimality only affects the embedding dimensionality, not
    its correctness.
    Values are ordered within a chain from most- to least-preferred.
    Deterministic: ties broken by ``repr`` of the value.
    """
    remaining = set(poset.domain)
    chains: list[list[Value]] = []
    while remaining:
        # Longest path in the DAG induced on `remaining` (order restricted
        # to remaining values stays transitive, so successor = any pair).
        order = sorted(remaining, key=repr)
        # topological: more-preferred values first (x before y if x ≻ y)
        succ = {
            x: [y for y in order if (x, y) in poset.pairs]
            for x in order
        }
        best: dict[Value, list[Value]] = {}

        def longest_from(v: Value) -> list[Value]:
            if v in best:
                return best[v]
            tail: list[Value] = []
            for w in succ[v]:
                cand = longest_from(w)
                if len(cand) > len(tail):
                    tail = cand
            best[v] = [v] + tail
            return best[v]

        chain = max((longest_from(v) for v in order), key=len)
        chains.append(chain)
        remaining -= set(chain)
    return chains


def cps_embedding(poset: Poset, chains: Sequence[Sequence[Value]] | None = None) -> dict[Value, tuple[int, ...]]:
    """Map each domain value to its chain-product coordinates.

    Coordinate ``i`` of ``v`` counts the elements of chain ``i`` that are
    dominated-by-or-equal-to ``v`` (i.e. ``u = v`` or ``v ≻ u``). Higher
    coordinates mean more preferred.
    """
    if chains is None:
        chains = chain_decomposition(poset)
    coords: dict[Value, tuple[int, ...]] = {}
    for v in poset.domain:
        coords[v] = tuple(
            sum(1 for u in chain if u == v or poset.prefers(v, u)) for chain in chains
        )
    return coords


def cps_prefers(coords: dict[Value, tuple[int, ...]], x: Value, y: Value) -> bool:
    """``x ≻ y`` evaluated purely on CPS coordinates."""
    cx, cy = coords[x], coords[y]
    return cx != cy and all(a >= b for a, b in zip(cx, cy))

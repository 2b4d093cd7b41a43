"""Strict-partial-order substrate: poset algebra and the CPS embedding."""
from repro.posets.poset import Poset, transitive_closure, is_strict_partial_order
from repro.posets.cps import chain_decomposition, cps_embedding

__all__ = [
    "Poset",
    "transitive_closure",
    "is_strict_partial_order",
    "chain_decomposition",
    "cps_embedding",
]

"""The paper's running laptop example: Tables I, II and VIII.

Table II's Hasse diagrams are garbled in the source text; the posets here
were reconstructed from the explicit relations quoted in Examples 1-3 and
validated against the frontiers the paper derives in Examples 2, 3, 5 and
15 (see tests/test_laptop_examples.py). Display values are bucketed as in
the paper ("13-15.9" etc.) by :func:`display_bucket`.
"""
from __future__ import annotations

from repro.posets.poset import Poset

ATTRS = ("display", "brand", "cpu")

#: Table I, keyed o1..o16; display stored as the paper's bucket label.
PRODUCTS: dict[str, tuple[str, str, str]] = {}


def display_bucket(inches: float) -> str:
    """Map a display size to the bucket labels of Table II."""
    if inches <= 9.9:
        return "9.9-under"
    if inches < 13:
        return "10-12.9"
    if inches < 16:
        return "13-15.9"
    if inches < 19:
        return "16-18.9"
    return "19-up"


_RAW_TABLE_I = [
    ("o1", 12, "Apple", "single"),
    ("o2", 14, "Apple", "dual"),
    ("o3", 15, "Samsung", "dual"),
    ("o4", 19, "Toshiba", "dual"),
    ("o5", 9, "Samsung", "quad"),
    ("o6", 11.5, "Sony", "single"),
    ("o7", 9.5, "Lenovo", "quad"),
    ("o8", 12.5, "Apple", "dual"),
    ("o9", 19.5, "Sony", "single"),
    ("o10", 9.5, "Lenovo", "triple"),
    ("o11", 9, "Toshiba", "triple"),
    ("o12", 8.5, "Samsung", "triple"),
    ("o13", 14.5, "Sony", "dual"),
    ("o14", 17, "Sony", "single"),
    ("o15", 16.5, "Lenovo", "quad"),
    ("o16", 16, "Toshiba", "single"),
]
for _id, _disp, _brand, _cpu in _RAW_TABLE_I:
    PRODUCTS[_id] = (display_bucket(_disp), _brand, _cpu)

DISPLAY_DOMAIN = ("13-15.9", "10-12.9", "16-18.9", "19-up", "9.9-under")
BRAND_DOMAIN = ("Apple", "Lenovo", "Samsung", "Sony", "Toshiba")
CPU_DOMAIN = ("single", "dual", "triple", "quad")
DOMAINS: dict[str, tuple[str, ...]] = {
    "display": DISPLAY_DOMAIN,
    "brand": BRAND_DOMAIN,
    "cpu": CPU_DOMAIN,
}


def _chain(*values: str, domain: tuple[str, ...]) -> Poset:
    return Poset([(values[i], values[i + 1]) for i in range(len(values) - 1)], domain=domain)


#: Table II, user c1. display: one chain; brand: Apple ≻ Lenovo ≻ Sony ≻
#: {Toshiba, Samsung}; cpu: dual ≻ {triple, quad} ≻ single.
C1_PREFS: dict[str, Poset] = {
    "display": _chain("13-15.9", "10-12.9", "16-18.9", "19-up", "9.9-under", domain=DISPLAY_DOMAIN),
    "brand": Poset(
        [("Apple", "Lenovo"), ("Lenovo", "Sony"), ("Sony", "Toshiba"), ("Sony", "Samsung")],
        domain=BRAND_DOMAIN,
    ),
    "cpu": Poset(
        [("dual", "triple"), ("dual", "quad"), ("triple", "single"), ("quad", "single")],
        domain=CPU_DOMAIN,
    ),
}

#: Table II, user c2. display: 13-15.9 ≻ {10-12.9, 16-18.9} ≻ 19-up ≻
#: 9.9-under; brand: Lenovo ≻ {Apple, Samsung} ≻ Toshiba ≻ Sony; cpu:
#: total order quad ≻ triple ≻ dual ≻ single.
C2_PREFS: dict[str, Poset] = {
    "display": Poset(
        [
            ("13-15.9", "10-12.9"),
            ("13-15.9", "16-18.9"),
            ("10-12.9", "19-up"),
            ("16-18.9", "19-up"),
            ("19-up", "9.9-under"),
        ],
        domain=DISPLAY_DOMAIN,
    ),
    "brand": Poset(
        [
            ("Lenovo", "Apple"),
            ("Lenovo", "Samsung"),
            ("Apple", "Toshiba"),
            ("Samsung", "Toshiba"),
            ("Toshiba", "Sony"),
        ],
        domain=BRAND_DOMAIN,
    ),
    "cpu": _chain("quad", "triple", "dual", "single", domain=CPU_DOMAIN),
}

USER_PREFS: dict[str, dict[str, Poset]] = {"c1": C1_PREFS, "c2": C2_PREFS}

#: Table VIII (the sliding-window example), keyed o1..o7.
SW_PRODUCTS: dict[str, tuple[str, str, str]] = {}
_RAW_TABLE_VIII = [
    ("o1", 17, "Lenovo", "dual"),
    ("o2", 9.5, "Sony", "single"),
    ("o3", 12, "Apple", "dual"),
    ("o4", 16, "Lenovo", "quad"),
    ("o5", 19, "Toshiba", "single"),
    ("o6", 12.5, "Samsung", "quad"),
    ("o7", 14, "Apple", "dual"),
]
for _id, _disp, _brand, _cpu in _RAW_TABLE_VIII:
    SW_PRODUCTS[_id] = (display_bucket(_disp), _brand, _cpu)

#: Table IV (Sec. V): six users' brand preferences for the similarity
#: examples 6-10 and 13-14, and their pairwise clusters U1..U3. The Hasse
#: diagrams are garbled in the source text; these were reconstructed so
#: that every number quoted in Examples 6-9, 13 and 14 reproduces exactly
#: (sim_i values 0/2/2, union sizes 6/7, maximal sets, weights, sim_wi =
#: 3/2, sim_wj = 3/11 and 3/12, vector sims 0.36 and 0.19).
_T4 = ("Apple", "Lenovo", "Samsung", "Toshiba")
TABLE_IV_BRAND: dict[str, Poset] = {
    # c1: Apple ≻ Lenovo ≻ Samsung; Toshiba ≻ Samsung
    "c1": Poset([("Apple", "Lenovo"), ("Lenovo", "Samsung"), ("Toshiba", "Samsung")], domain=_T4),
    # c2: Apple ≻ Lenovo ≻ Samsung; Toshiba ≻ Lenovo
    "c2": Poset([("Apple", "Lenovo"), ("Toshiba", "Lenovo"), ("Lenovo", "Samsung")], domain=_T4),
    # c3: Samsung ≻ Lenovo ≻ {Apple, Toshiba}
    "c3": Poset([("Samsung", "Lenovo"), ("Lenovo", "Apple"), ("Lenovo", "Toshiba")], domain=_T4),
    # c4: Samsung ≻ Lenovo ≻ Apple ≻ Toshiba (a chain)
    "c4": Poset([("Samsung", "Lenovo"), ("Lenovo", "Apple"), ("Apple", "Toshiba")], domain=_T4),
    # c5: Lenovo ≻ {Apple, Toshiba} ≻ Samsung
    "c5": Poset(
        [("Lenovo", "Apple"), ("Lenovo", "Toshiba"), ("Apple", "Samsung"), ("Toshiba", "Samsung")],
        domain=_T4,
    ),
    # c6: Lenovo ≻ Apple ≻ {Toshiba, Samsung}
    "c6": Poset([("Lenovo", "Apple"), ("Apple", "Toshiba"), ("Apple", "Samsung")], domain=_T4),
}

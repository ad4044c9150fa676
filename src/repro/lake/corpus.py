"""Entity-string universes used to populate synthetic data lakes.

The paper's lakes (Canadian Open Data, WDC Web Tables) are dominated by
name-like string key columns: person names, street addresses, company
names, area names. Each generator below produces a large deterministic
universe of such strings by combinatorial composition, so lakes at any
scale can sample disjoint or overlapping entity sets.
"""
from __future__ import annotations

import numpy as np

__all__ = ["person_names", "addresses", "company_names", "area_names", "UNIVERSES"]

_FIRST = [
    "Tom", "Jerry", "Spike", "Tyke", "Bruce", "Alice", "Carol", "David",
    "Elena", "Frank", "Grace", "Henry", "Irene", "James", "Karen", "Liam",
    "Maria", "Nora", "Oscar", "Peter", "Quinn", "Rosa", "Steve", "Tina",
    "Uma", "Victor", "Wendy", "Xavier", "Yuri", "Zoe",
]
_LAST = [
    "Smith", "Johnson", "Williams", "Brown", "Jones", "Garcia", "Miller",
    "Davis", "Rodriguez", "Martinez", "Hernandez", "Lopez", "Gonzalez",
    "Wilson", "Anderson", "Thomas", "Taylor", "Moore", "Jackson", "Martin",
    "Lee", "Perez", "Thompson", "White", "Harris", "Sanchez", "Clark",
    "Ramirez", "Lewis", "Robinson",
]
_STREETS = [
    "East {n}th Street", "West {n}th Street", "North {n}th Avenue",
    "South {n}th Avenue", "{n}th Boulevard", "{n}th Road",
]
_COMPANY_CORE = [
    "Acme", "Globex", "Initech", "Umbrella", "Stark", "Wayne", "Wonka",
    "Tyrell", "Cyberdyne", "Aperture", "BlueSky", "Redwood", "Silverline",
    "Northwind", "Contoso", "Fabrikam", "Hooli", "Pied Piper", "Vandelay",
    "Dunder Mifflin", "Sterling", "Massive Dynamic", "Oscorp", "LexCorp",
    "Gringotts", "Monarch", "Helix", "Vertex", "Quantum", "Nimbus",
]
_COMPANY_SUFFIX = [
    "Incorporated", "Corporation", "Company", "Limited", "Services",
    "International", "Group", "Holdings", "Partners", "Solutions",
]
_AREA_PREFIX = [
    "Castle", "Bronx", "Eden", "River", "Green", "Clinton", "Spring",
    "Forest", "Oak", "Maple", "Cedar", "Willow", "Harbor", "Sunny",
    "Bay", "Park", "Lake", "Hill", "Glen", "Rock",
]
_AREA_SUFFIX = [
    "Hill", "dale", "wald", "side", "wich", "wood", "field", "haven",
    "ridge", "view", "port", "crest", "shore", "gate", "brook", "mont",
]


def _tiered(n: int, seed: int, tiers: list[list[str]]) -> list[str]:
    """Sample ``n`` distinct strings, expanding tier by tier as needed.

    Tiers are compositional (e.g. two-part then three-part names) so an
    exhausted pool never degrades into trivial near-duplicates like
    "Tom Smith 1" — those would silently turn distractor columns into
    hard joinable look-alikes of query entities.
    """
    g = np.random.default_rng(seed)
    pool: list[str] = []
    for tier in tiers:
        pool.extend(tier)
        if len(pool) >= n:
            break
    if n > len(pool):
        raise ValueError(f"universe exhausted: need {n}, have {len(pool)}")
    idx = g.permutation(len(pool))[:n]
    return [pool[i] for i in idx]


def person_names(n: int, *, seed: int = 0) -> list[str]:
    """``n`` distinct names ("First Last", then "First Middle Last")."""
    return _tiered(
        n,
        seed,
        [
            [f"{f} {l}" for f in _FIRST for l in _LAST],
            [f"{f} {m} {l}" for f in _FIRST for m in _LAST for l in _LAST if m != l],
        ],
    )


def addresses(n: int, *, seed: int = 0) -> list[str]:
    """``n`` distinct street addresses like "414 East 10th Street, 4E"."""
    g = np.random.default_rng(seed)
    out, used = [], set()
    while len(out) < n:
        num = int(g.integers(1, 999))
        street = _STREETS[int(g.integers(0, len(_STREETS)))].format(
            n=int(g.integers(1, 99))
        )
        unit = f"{int(g.integers(1, 9))}{chr(65 + int(g.integers(0, 6)))}"
        s = f"{num} {street}, {unit}"
        if s not in used:
            used.add(s)
            out.append(s)
    return out


def company_names(n: int, *, seed: int = 0) -> list[str]:
    """``n`` distinct company names ("Acme Holdings", then compounds)."""
    return _tiered(
        n,
        seed,
        [
            [f"{c} {s}" for c in _COMPANY_CORE for s in _COMPANY_SUFFIX],
            [
                f"{a} {b} {s}"
                for a in _COMPANY_CORE
                for b in _COMPANY_CORE
                if a != b
                for s in _COMPANY_SUFFIX
            ],
            [
                f"{a} {b} {c} {s}"
                for a in _COMPANY_CORE
                for b in _COMPANY_CORE
                if a != b
                for c in _COMPANY_CORE
                if c not in (a, b)
                for s in _COMPANY_SUFFIX[:3]
            ],
        ],
    )


def area_names(n: int, *, seed: int = 0) -> list[str]:
    """``n`` distinct neighborhood names like "Castle Hill", "Bronxdale"."""
    base = [
        f"{p} {s}" if s[0].isupper() else f"{p}{s}"
        for p in _AREA_PREFIX
        for s in _AREA_SUFFIX
    ]
    compound = [
        f"{q} {b}" for q in ("Upper", "Lower", "New", "Old", "Little", "Great")
        for b in base
    ]
    return _tiered(n, seed, [base, compound])


UNIVERSES = {
    "person": person_names,
    "address": addresses,
    "company": company_names,
    "area": area_names,
}

"""String perturbations that model data-lake heterogeneity.

The paper's motivating example (Table I) shows the same entity written
differently across tables: misspellings ("Jerry" vs "Jerr."),
abbreviations ("Street" vs "St."), case and format changes
("616 EAST 9TH STREET, 4W" vs "616 East 9th St."). These generators
apply such edits deterministically (seeded) so the synthetic lake
contains *semantically joinable but not equi-joinable* records —
exactly the records equi-join misses and PEXESO must recover.
"""
from __future__ import annotations

import numpy as np

__all__ = ["typo", "abbreviate", "reformat", "perturb", "PERTURBATIONS"]

_ABBREVIATIONS = {
    "street": "st.",
    "avenue": "ave.",
    "boulevard": "blvd.",
    "road": "rd.",
    "east": "e.",
    "west": "w.",
    "north": "n.",
    "south": "s.",
    "march": "mar",
    "january": "jan",
    "incorporated": "inc.",
    "corporation": "corp.",
    "company": "co.",
    "limited": "ltd.",
    "services": "svcs",
    "international": "intl",
}


def typo(s: str, g: np.random.Generator) -> str:
    """One character-level edit: drop, swap, or duplicate a character."""
    if len(s) < 3:
        return s
    i = int(g.integers(1, len(s) - 1))
    op = int(g.integers(0, 3))
    if op == 0:  # drop
        return s[:i] + s[i + 1 :]
    if op == 1:  # swap adjacent
        return s[: i - 1] + s[i] + s[i - 1] + s[i + 1 :]
    return s[:i] + s[i] + s[i:]  # duplicate


def abbreviate(s: str, g: np.random.Generator) -> str:
    """Replace known long forms by abbreviations (or truncate one word)."""
    words = s.split()
    out = []
    hit = False
    for w in words:
        key = w.lower().strip(",.")
        if key in _ABBREVIATIONS:
            out.append(_ABBREVIATIONS[key])
            hit = True
        else:
            out.append(w)
    if not hit and words:
        # No known abbreviation: truncate the longest word ("Jerry"->"Jerr.").
        i = max(range(len(words)), key=lambda j: len(words[j]))
        if len(words[i]) > 4:
            out[i] = words[i][:-2] + "."
    return " ".join(out)


def reformat(s: str, g: np.random.Generator) -> str:
    """Case / punctuation changes that keep the characters' meaning."""
    op = int(g.integers(0, 3))
    if op == 0:
        return s.upper()
    if op == 1:
        return s.title()
    return s.replace(",", " ").replace("  ", " ").strip()


PERTURBATIONS = [typo, abbreviate, reformat]


def perturb(s: str, g: np.random.Generator, *, n_edits: int = 1) -> str:
    """Apply ``n_edits`` randomly chosen perturbations to ``s``."""
    for _ in range(n_edits):
        fn = PERTURBATIONS[int(g.integers(0, len(PERTURBATIONS)))]
        s = fn(s, g)
    return s

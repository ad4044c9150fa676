"""Unit tests for the perturbation generators."""
import numpy as np
import pytest

from repro.embedding.perturb import abbreviate, perturb, reformat, typo


@pytest.fixture
def g():
    return np.random.default_rng(0)


def test_typo_changes_string(g):
    s = "616 East 9th Street"
    outs = {typo(s, g) for _ in range(20)}
    assert any(o != s for o in outs)


def test_typo_short_string_noop(g):
    assert typo("ab", g) == "ab"


def test_typo_length_within_one(g):
    s = "Castle Hill"
    for _ in range(30):
        assert abs(len(typo(s, g)) - len(s)) <= 1


def test_abbreviate_known_words(g):
    assert "st." in abbreviate("616 East Street", g).lower().split()


def test_abbreviate_truncates_when_no_known_word(g):
    out = abbreviate("Jerry Wonka", g)
    assert out != "Jerry Wonka" and "." in out


def test_reformat_preserves_letters(g):
    s = "616 East 9th Street, 4W"
    for _ in range(10):
        out = reformat(s, g)
        assert sorted(out.lower().replace(",", " ").split()) == sorted(
            s.lower().replace(",", " ").split()
        )


def test_perturb_deterministic_given_rng():
    a = perturb("Castle Hill Apartments", np.random.default_rng(7))
    b = perturb("Castle Hill Apartments", np.random.default_rng(7))
    assert a == b


@pytest.mark.parametrize("n_edits", [1, 2, 3])
def test_perturb_n_edits(g, n_edits):
    out = perturb("414 East 10th Street, 4E", g, n_edits=n_edits)
    assert isinstance(out, str) and out

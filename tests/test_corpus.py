"""Unit tests for the entity universes."""
import pytest

from repro.lake import corpus


@pytest.mark.parametrize("kind", list(corpus.UNIVERSES))
@pytest.mark.parametrize("n", [1, 10, 250])
def test_distinct_and_sized(kind, n):
    vals = corpus.UNIVERSES[kind](n, seed=1)
    assert len(vals) == n
    assert len(set(vals)) == n


@pytest.mark.parametrize("kind", list(corpus.UNIVERSES))
def test_deterministic(kind):
    assert corpus.UNIVERSES[kind](50, seed=9) == corpus.UNIVERSES[kind](50, seed=9)


@pytest.mark.parametrize("kind", list(corpus.UNIVERSES))
def test_seed_changes_sample(kind):
    a = corpus.UNIVERSES[kind](50, seed=1)
    b = corpus.UNIVERSES[kind](50, seed=2)
    assert a != b


def test_large_universe_expansion():
    vals = corpus.person_names(2000, seed=0)
    assert len(set(vals)) == 2000


def test_addresses_have_structure():
    for a in corpus.addresses(20, seed=0):
        assert "," in a and any(ch.isdigit() for ch in a)

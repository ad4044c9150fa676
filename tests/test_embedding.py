"""Unit tests for the hashing embedders (fastText/GloVe substitutes)."""
import numpy as np
import pytest

from repro.embedding.hashing import (
    MAX_DISTANCE,
    embed,
    embed_many,
    fasttext_lite,
    glove_lite,
)


@pytest.mark.parametrize("model", ["fasttext", "glove"])
@pytest.mark.parametrize("s", ["Tom", "616 East 9th St.", "Acme Holdings", "a", ""])
def test_unit_norm(model, s):
    v = embed(s, model=model)
    assert np.isclose(np.linalg.norm(v), 1.0)


@pytest.mark.parametrize("model", ["fasttext", "glove"])
def test_deterministic(model):
    a = embed("Castle Hill", model=model)
    b = embed("Castle Hill", model=model)
    assert np.array_equal(a, b)


@pytest.mark.parametrize("fn,dim", [(fasttext_lite, 300), (glove_lite, 50)])
def test_default_dims(fn, dim):
    assert fn("hello world").shape == (dim,)


def test_custom_dim():
    assert embed("x", model="glove", dim=24).shape == (24,)


@pytest.mark.parametrize("model", ["fasttext", "glove"])
def test_case_insensitive(model):
    assert np.allclose(embed("Main Street", model=model), embed("main street", model=model))


@pytest.mark.parametrize("model", ["fasttext", "glove"])
def test_similar_closer_than_unrelated(model):
    """The property PEXESO needs: typo distance << unrelated distance."""
    base = embed("616 east 9th street", model=model)
    typo = embed("616 east 9th stret", model=model)
    other = embed("nimbus quantum holdings", model=model)
    assert np.linalg.norm(base - typo) < np.linalg.norm(base - other)


@pytest.mark.parametrize("model", ["fasttext", "glove"])
def test_max_distance_bound(model):
    a, b = embed("alpha", model=model), embed("omega", model=model)
    assert np.linalg.norm(a - b) <= MAX_DISTANCE + 1e-9


def test_embed_many_stacks():
    M = embed_many(["a", "b", "c"], model="glove", dim=16)
    assert M.shape == (3, 16)
    assert np.allclose(M[1], embed("b", model="glove", dim=16))


def test_embed_many_empty():
    assert embed_many([], model="glove", dim=16).shape[0] == 0


def test_empty_string_has_vector():
    v = embed("", model="fasttext")
    assert np.isclose(np.linalg.norm(v), 1.0)


def test_word_average_order_insensitive():
    """glove_lite averages word vectors, so word order must not matter."""
    a = glove_lite("castle hill")
    b = glove_lite("hill castle")
    assert np.allclose(a, b)


def test_fasttext_whole_string_order_sensitive():
    a = fasttext_lite("castle hill")
    b = fasttext_lite("hill castle")
    assert not np.allclose(a, b)

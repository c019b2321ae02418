"""Tokenizer unit tests."""
from hypothesis import given, strategies as st

from repro.text.tokenizer import char_ngrams, words


def test_words_lowercases_and_splits():
    assert words("Hello, World-42!") == ["hello", "world", "42"]


def test_words_empty():
    assert words("") == []
    assert words("!!! ---") == []


def test_char_ngrams_includes_full_word():
    grams = char_ngrams("cat")
    assert "<cat>" in grams


def test_char_ngrams_boundary_markers():
    grams = char_ngrams("cat", 3, 3)
    assert "<ca" in grams and "at>" in grams


def test_char_ngrams_short_word():
    # word shorter than n still yields the marked word itself
    grams = char_ngrams("a", 3, 4)
    assert "<a>" in grams


def test_similar_words_share_ngrams():
    a = set(char_ngrams("katema"))
    b = set(char_ngrams("katima"))  # one-char misspelling
    c = set(char_ngrams("zulopo"))
    assert len(a & b) / len(a | b) > 0.3
    assert len(a & c) / len(a | c) < 0.1


@given(st.text(alphabet="abcdefghij", min_size=1, max_size=12))
def test_char_ngrams_deterministic_and_nonempty(w):
    assert char_ngrams(w) == char_ngrams(w)
    assert len(char_ngrams(w)) >= 1


@given(st.text(max_size=50))
def test_words_always_lowercase_alnum(t):
    for w in words(t):
        assert w == w.lower()
        assert w.isalnum()

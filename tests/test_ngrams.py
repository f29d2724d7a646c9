"""N-gram candidate generation."""
from repro.aliasing.ngrams import MAX_N, ngrams


def test_longest_first():
    grams = list(ngrams(["a", "b", "c"]))
    assert grams[0] == (0, 3, "a b c")
    assert grams[-1] == (2, 1, "c")


def test_lengths_descend():
    lengths = [n for _, n, _ in ngrams(["a", "b", "c", "d"])]
    assert lengths == sorted(lengths, reverse=True)


def test_counts():
    toks = list("abcd")
    assert len(list(ngrams(toks))) == 4 + 3 + 2 + 1


def test_max_n_clamped():
    toks = [str(i) for i in range(10)]
    assert max(n for _, n, _ in ngrams(toks)) == MAX_N


def test_max_n_override():
    assert max(n for _, n, _ in ngrams(list("abcdef"), max_n=2)) == 2


def test_single_token():
    assert list(ngrams(["x"])) == [(0, 1, "x")]


def test_empty():
    assert list(ngrams([])) == []


def test_positions_within_length_ascend():
    grams = [(i, n) for i, n, _ in ngrams(list("abcd")) if n == 2]
    assert grams == [(0, 2), (1, 2), (2, 2)]

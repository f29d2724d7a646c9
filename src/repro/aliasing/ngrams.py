"""N-gram candidate generation for lexicon matching.

The paper matches phrases against the ingredient list with n-grams up to
6-grams, preferring the longest (most specific) match — 'coriander seed'
must win over 'coriander', 'tomato paste' over 'tomato'.
"""
from __future__ import annotations

from typing import Iterator

MAX_N = 6


def ngrams(tokens: list[str], max_n: int = MAX_N) -> Iterator[tuple[int, int, str]]:
    """Yield (start, length, joined n-gram), longest n-grams first.

    Within a length, earlier positions come first, so greedy matching is
    deterministic.
    """
    top = min(max_n, len(tokens))
    for n in range(top, 0, -1):
        for i in range(len(tokens) - n + 1):
            yield i, n, " ".join(tokens[i : i + n])

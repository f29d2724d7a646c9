"""Text normalization for ingredient aliasing (NLTK/inflect replacement).

Pipeline (paper Methodology §A): lowercase → strip punctuation/special
characters → drop stopwords (standard English plus culinary) and numeric
tokens → singularize every token.

The same :func:`normalize_name` is applied to lexicon entries and to
phrases, so rule-based singularization only has to be *consistent*, not
linguistically perfect (e.g. 'hops' → 'hop' on both sides still matches).
"""
from __future__ import annotations

import re

#: Standard English stopwords (compact) + culinary stopwords: units,
#: quantities, preparation verbs and descriptors.  Must stay disjoint
#: from words that can appear inside ingredient names.
STOPWORDS: frozenset[str] = frozenset(
    """
    a an and are as at be but by for from in into is it of on or such that
    the their then there these they this to was will with

    cup tablespoon teaspoon tbsp tsp ounce oz pound lb gram kg ml liter
    pinch dash slice stick jar package bunch sprig piece

    chopped diced minced sliced grated peeled crushed finely thinly
    coarsely roughly fresh freshly frozen ripe cooked boiled roasted
    grilled toasted melted softened beaten divided optional taste needed
    large small medium extra halved quartered trimmed drained rinsed slit
    cut more plus room temperature serving garnish
    """.split()
)

#: Words that look plural but are singular (never strip their final 's').
_SINGULAR_EXCEPTIONS: frozenset[str] = frozenset(
    {"molasses", "couscous", "hummus", "asparagus", "swiss", "citrus"}
)

_PUNCT_RE = re.compile(r"[^a-z0-9\s]")
_NUM_RE = re.compile(r"^[\d/.]+$")


def singularize(word: str) -> str:
    """Rule-based singular form of a single lowercase token.

    Inverts the common English pluralization rules: ``ies``→``y``,
    ``Xes``→``X`` for sibilant stems, otherwise strip a final ``s``
    (except for ``ss`` endings and known exceptions).
    """
    if word in _SINGULAR_EXCEPTIONS or len(word) <= 3:
        return word
    if word.endswith("ies"):
        return word[:-3] + "y"
    if word.endswith(("ses", "xes", "zes", "ches", "shes")):
        return word[:-2]
    if word.endswith("s") and not word.endswith("ss"):
        return word[:-1]
    return word


def pluralize(word: str) -> str:
    """Naive English pluralizer for a (possibly multi-word) name.

    Inverse of :func:`singularize` for regular nouns; shared by the
    phrase synthesizer and the lexicon builder so both sides agree on
    surface forms.
    """
    parts = word.split(" ")
    last = parts[-1]
    if last.endswith(("s", "x", "z", "ch", "sh")):
        last += "es"
    elif last.endswith("y") and len(last) > 1 and last[-2] not in "aeiou":
        last = last[:-1] + "ies"
    else:
        last += "s"
    return " ".join(parts[:-1] + [last])


def tokenize(text: str) -> list[str]:
    """Lowercase, strip punctuation, split; keep all tokens."""
    return _PUNCT_RE.sub(" ", text.lower()).split()


def normalize(text: str) -> list[str]:
    """Full phrase normalization → list of singularized content tokens.

    Stopwords are tested on the *singularized* token so plural units
    ("cups", "tablespoons") are removed by the singular entry.
    """
    out = []
    for t in tokenize(text):
        if _NUM_RE.match(t):
            continue
        s = singularize(t)
        if s not in STOPWORDS:
            out.append(s)
    return out


def normalize_name(name: str) -> str:
    """Canonical lexicon key for an ingredient name or synonym."""
    return " ".join(singularize(t) for t in tokenize(name))

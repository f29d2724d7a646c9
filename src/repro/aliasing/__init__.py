"""Ingredient aliasing: map raw recipe phrases to ingredient ids.

Implements the paper's Methodology §A protocol — lowercase, strip
punctuation/special characters, remove English and culinary stopwords,
singularize, then match n-grams (up to 6-grams) against the curated
ingredient lexicon, labeling partial and unrecognized phrases.

The paper used NLTK and the ``inflect`` package; neither is available
offline, so :mod:`repro.aliasing.textnorm` implements the required
normalization (stopword list, rule-based singularizer, spelling-variant
synonyms) from scratch.  See DESIGN.md §2.
"""
from repro.aliasing.mapper import alias_phrases
from repro.aliasing.ngrams import ngrams
from repro.aliasing.textnorm import normalize, normalize_name, singularize

__all__ = ["alias_phrases", "ngrams", "normalize", "normalize_name", "singularize"]

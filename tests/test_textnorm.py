"""Text normalization (the NLTK/inflect replacement)."""
import pytest

from repro.aliasing.textnorm import (
    STOPWORDS,
    normalize,
    normalize_name,
    pluralize,
    singularize,
    tokenize,
)


@pytest.mark.parametrize("plural,singular", [
    ("peppers", "pepper"),
    ("tomatoes", "tomatoe"),  # rule-based; consistent on both sides
    ("berries", "berry"),
    ("glasses", "glass"),
    ("boxes", "box"),
    ("peaches", "peach"),
    ("radishes", "radish"),
    ("cups", "cup"),
    ("molasses", "molasses"),
    ("couscous", "couscous"),
    ("hummus", "hummus"),
    ("asparagus", "asparagus"),
    ("swiss", "swiss"),
    ("gas", "gas"),  # len <= 3 left alone
    ("egg", "egg"),
])
def test_singularize(plural, singular):
    assert singularize(plural) == singular


@pytest.mark.parametrize("word", [
    "pepper", "berry", "box", "peach", "onion", "chili", "jalapeno pepper",
    "coriander seed", "black bear",
])
def test_pluralize_roundtrip_through_lexicon_keys(word):
    # singular-derived and plural-derived keys both resolve consistently:
    # singularize(pluralize(w)) must be a deterministic function of w
    assert singularize(pluralize(word).split()[-1]) == singularize(
        pluralize(word).split()[-1]
    )


@pytest.mark.parametrize("word,plural", [
    ("pepper", "peppers"),
    ("berry", "berries"),
    ("box", "boxes"),
    ("peach", "peaches"),
    ("radish", "radishes"),
    ("jalapeno pepper", "jalapeno peppers"),
])
def test_pluralize(word, plural):
    assert pluralize(word) == plural


def test_tokenize_strips_punctuation_and_case():
    assert tokenize("2 Jalapeno-Peppers, (roasted & slit)!") == [
        "2", "jalapeno", "peppers", "roasted", "slit",
    ]


def test_normalize_drops_numbers_units_descriptors():
    assert normalize("2 1/2 cups finely chopped fresh basil") == ["basil"]


def test_normalize_keeps_name_tokens():
    assert normalize("3 tablespoons tomato paste, or more") == ["tomato", "paste"]


def test_normalize_plural_unit_removed():
    assert normalize("2 Tablespoons coriander seeds") == ["coriander", "seed"]


def test_normalize_empty():
    assert normalize("2 1/2, (!)") == []


def test_normalize_name_joins_singulars():
    assert normalize_name("Jalapeno Peppers") == "jalapeno pepper"
    assert normalize_name("coriander seed") == "coriander seed"


def test_stopwords_lowercase():
    assert all(w == w.lower() for w in STOPWORDS)


def test_stopwords_do_not_contain_ingredient_words():
    # words that occur inside master ingredient names must never be stopwords
    from repro.flavordb.ingredients import ingredient_master

    name_tokens = set()
    for name in ingredient_master()["name"]:
        name_tokens |= set(tokenize(name))
    overlap = name_tokens & STOPWORDS
    assert not overlap, f"stopwords shadow ingredient name tokens: {overlap}"

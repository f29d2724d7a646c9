"""Phrase synthesis for the aliasing pipeline."""
import numpy as np
import pytest

from repro.aliasing.textnorm import normalize_name
from repro.culinarydb.phrases import make_phrase, phrases_df
from repro.flavordb.ingredients import ingredient_master


def test_make_phrase_contains_surface_form():
    master = ingredient_master()
    row = master[master["name"] == "onion"].iloc[0]
    rng = np.random.default_rng(0)
    for _ in range(20):
        ph = make_phrase(rng, row["name"], tuple(row["synonyms"]))
        assert "onion" in ph.lower()


def test_make_phrase_uses_synonyms_sometimes():
    master = ingredient_master()
    row = master[master["name"] == "whiskey"].iloc[0]
    rng = np.random.default_rng(0)
    surfaces = {make_phrase(rng, row["name"], tuple(row["synonyms"])) for _ in range(60)}
    assert any("whisky" in s.lower() for s in surfaces)
    assert any("whiskey" in s.lower() for s in surfaces)


def test_make_phrase_deterministic_given_rng_state():
    rng1 = np.random.default_rng(42)
    rng2 = np.random.default_rng(42)
    assert make_phrase(rng1, "basil", ()) == make_phrase(rng2, "basil", ())


def test_phrases_df_row_per_usage(spark, exploded_small):
    sample = exploded_small.limit(100)
    out = phrases_df(sample)
    assert out.count() == 100
    assert set(out.columns) == {"recipe_id", "region", "ingredient_id", "phrase"}


def test_phrases_df_deterministic(spark, exploded_small):
    sample = exploded_small.orderBy("recipe_id", "ingredient_id").limit(50)
    a = phrases_df(sample, seed=23).orderBy("recipe_id", "ingredient_id").collect()
    b = phrases_df(sample, seed=23).orderBy("recipe_id", "ingredient_id").collect()
    assert [r["phrase"] for r in a] == [r["phrase"] for r in b]


def test_phrases_df_seed_changes_output(spark, exploded_small):
    sample = exploded_small.orderBy("recipe_id", "ingredient_id").limit(50)
    a = phrases_df(sample, seed=23).orderBy("recipe_id", "ingredient_id").collect()
    b = phrases_df(sample, seed=24).orderBy("recipe_id", "ingredient_id").collect()
    assert [r["phrase"] for r in a] != [r["phrase"] for r in b]


def test_phrase_normalizes_back_to_name_tokens():
    from repro.aliasing.textnorm import normalize, pluralize

    master = ingredient_master()
    rng = np.random.default_rng(5)
    for _, row in master.sample(30, random_state=2).iterrows():
        ph = make_phrase(rng, row["name"], ())
        # the normalized phrase must contain one of the two lexicon keys
        # (singular-derived or plural-derived surface form)
        keys = {normalize_name(row["name"]), normalize_name(pluralize(row["name"]))}
        assert any(k in " ".join(normalize(ph)) for k in keys)

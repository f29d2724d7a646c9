"""Aliasing: phrase → ingredient id (driver logic + Spark pipeline)."""
import numpy as np
import pyspark.sql.functions as F
import pytest

from repro.aliasing.mapper import alias_one, alias_phrases, build_lexicon
from repro.culinarydb.phrases import make_phrase, phrases_df
from repro.flavordb.ingredients import ingredient_master


@pytest.fixture(scope="module")
def lex():
    return build_lexicon()


def test_lexicon_has_no_collisions(lex):
    # build_lexicon raises on collision; reaching here is the assertion,
    # but also sanity-check the size covers every ingredient
    master = ingredient_master()
    assert len(set(lex.values())) == len(master)


def test_exact_match(lex):
    master = ingredient_master()
    iid = int(master.loc[master["name"] == "jalapeno pepper", "ingredient_id"].iloc[0])
    assert alias_one("2 jalapeno peppers, roasted and slit", lex) == (iid, "exact")


def test_synonym_match(lex):
    master = ingredient_master()
    iid = int(master.loc[master["name"] == "whiskey", "ingredient_id"].iloc[0])
    got, status = alias_one("3 tbsp whisky", lex)
    assert got == iid and status == "exact"


def test_longest_ngram_wins(lex):
    master = ingredient_master()
    paste = int(master.loc[master["name"] == "tomato paste", "ingredient_id"].iloc[0])
    tomato = int(master.loc[master["name"] == "tomato", "ingredient_id"].iloc[0])
    got, _ = alias_one("1 cup tomato paste", lex)
    assert got == paste != tomato


def test_partial_when_leftover_tokens(lex):
    got, status = alias_one("mystery gloop with basil", lex)
    assert status == "partial" and got is not None


def test_unmatched(lex):
    assert alias_one("totally unknown gizmo", lex) == (None, "unmatched")


def test_empty_phrase(lex):
    assert alias_one("2 1/2 cups", lex) == (None, "unmatched")


def test_bulk_accuracy_on_synthetic_phrases(lex):
    master = ingredient_master()
    rng = np.random.default_rng(0)
    sample = master.sample(200, random_state=1)
    for _, row in sample.iterrows():
        ph = make_phrase(rng, row["name"], tuple(row["synonyms"]))
        got, _ = alias_one(ph, lex)
        assert got == row["ingredient_id"], (ph, row["name"])


def test_spark_alias_phrases_recovers_corpus(spark, exploded_small):
    sample = exploded_small.limit(400)
    phrases = phrases_df(sample, seed=23)
    aliased = alias_phrases(phrases)
    total = aliased.count()
    correct = aliased.where(F.col("mapped_id") == F.col("ingredient_id")).count()
    assert total == 400
    assert correct == total  # exact recovery on the synthetic corpus


def test_spark_alias_phrases_schema(spark, exploded_small):
    aliased = alias_phrases(phrases_df(exploded_small.limit(5)))
    assert {"mapped_id", "status", "phrase", "ingredient_id"} <= set(aliased.columns)
    statuses = {r["status"] for r in aliased.collect()}
    assert statuses <= {"exact", "partial", "unmatched"}

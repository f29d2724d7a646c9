"""Flavor profiles: size bounds, community structure, compound pooling."""
import numpy as np
import pandas as pd
import pyspark.sql.functions as F
import pytest

from repro.flavordb.ingredients import N_INGREDIENTS, ingredient_master
from repro.flavordb.molecules import N_MOLECULES, molecule_community
from repro.flavordb.profiles import (
    basic_profiles,
    profiles_df,
    shared_matrix_numpy,
)


@pytest.fixture(scope="module")
def master():
    return ingredient_master()


@pytest.fixture(scope="module")
def basic():
    return basic_profiles()


def test_profile_sizes_within_bounds(basic):
    sizes = basic.groupby("ingredient_id").size()
    assert sizes.between(5, 150).all()


def test_no_duplicate_molecules_per_ingredient(basic):
    assert not basic.duplicated(["ingredient_id", "molecule_id"]).any()


def test_molecule_ids_valid(basic):
    assert basic["molecule_id"].between(0, N_MOLECULES - 1).all()


def test_only_basic_profiled_ingredients(basic, master):
    expected = set(
        master.loc[~master["is_compound"] & master["has_profile"], "ingredient_id"]
    )
    assert set(basic["ingredient_id"]) == expected


def test_majority_of_profile_from_home_community(basic, master):
    comm = master.set_index("ingredient_id")["community"]
    b = basic.copy()
    b["mol_comm"] = molecule_community(b["molecule_id"].to_numpy())
    b["home"] = b["ingredient_id"].map(comm)
    frac_home = (b["mol_comm"] == b["home"]).groupby(b["ingredient_id"]).mean()
    assert (frac_home > 0.5).all()
    assert frac_home.mean() > 0.7


def test_deterministic(basic):
    again = basic_profiles.__wrapped__(7)
    pd.testing.assert_frame_equal(basic.reset_index(drop=True), again)


def test_profiles_df_pools_compounds(spark, master):
    prof = profiles_df(spark).toPandas()
    basic = basic_profiles()
    by_ing = {i: set(g["molecule_id"]) for i, g in prof.groupby("ingredient_id")}
    # every compound's profile is exactly the union of its constituents'
    for _, row in master[master["is_compound"]].head(15).iterrows():
        expected = set()
        for c in row["constituents"]:
            expected |= set(basic.loc[basic["ingredient_id"] == c, "molecule_id"])
        assert by_ing[row["ingredient_id"]] == expected


def test_profiles_df_excludes_profile_less_additives(spark, master):
    prof = profiles_df(spark)
    no_prof_ids = [
        int(i) for i in master.loc[~master["has_profile"], "ingredient_id"]
    ]
    assert prof.where(F.col("ingredient_id").isin(no_prof_ids)).count() == 0


def test_profiles_df_no_duplicates(spark):
    prof = profiles_df(spark)
    assert prof.count() == prof.distinct().count()


def test_shared_matrix_numpy_properties(spark):
    prof = profiles_df(spark).toPandas()
    s = shared_matrix_numpy(prof)
    assert s.shape == (N_INGREDIENTS + 1, N_INGREDIENTS + 1)
    assert (s == s.T).all()
    assert (np.diag(s) == 0).all()
    assert (s[N_INGREDIENTS, :] == 0).all()  # padding slot
    assert s.max() > 0


def test_shared_matrix_numpy_matches_set_intersection(spark):
    prof = profiles_df(spark).toPandas()
    s = shared_matrix_numpy(prof)
    sets = {i: set(g["molecule_id"]) for i, g in prof.groupby("ingredient_id")}
    ids = sorted(sets)[:20]
    for a in ids:
        for b in ids:
            if a != b:
                assert s[a, b] == len(sets[a] & sets[b])

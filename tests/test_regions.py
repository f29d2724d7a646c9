"""Paper ground-truth constants (Table 1, Fig. 4 signs)."""
import pytest

from repro.regions import (
    EXTRA_WORLD_RECIPES,
    NEGATIVE_REGIONS,
    POSITIVE_REGIONS,
    REGIONS,
    TOTAL_RECIPES,
    by_code,
    table1_rows,
)


def test_twenty_two_regions():
    assert len(REGIONS) == 22


def test_total_recipe_count_matches_abstract():
    assert sum(r.recipes for r in REGIONS) + EXTRA_WORLD_RECIPES == TOTAL_RECIPES == 45772


def test_sixteen_positive_six_negative():
    assert len(POSITIVE_REGIONS) == 16
    assert len(NEGATIVE_REGIONS) == 6


def test_negative_regions_match_paper():
    assert set(NEGATIVE_REGIONS) == {"SCND", "JPN", "DACH", "BRI", "KOR", "EE"}


def test_positive_regions_include_paper_examples():
    for code in ("ITA", "AFR", "CBN", "GRC", "ESP", "USA"):
        assert code in POSITIVE_REGIONS


def test_codes_unique():
    codes = [r.code for r in REGIONS]
    assert len(codes) == len(set(codes))


def test_by_code_roundtrip():
    for r in REGIONS:
        assert by_code(r.code) is r


def test_by_code_unknown_raises():
    with pytest.raises(KeyError):
        by_code("XX")


def test_table1_rows_shape():
    rows = table1_rows()
    assert len(rows) == 22
    assert all(len(row) == 4 for row in rows)


@pytest.mark.parametrize("code,recipes,ingredients", [
    ("KOR", 301, 198),
    ("USA", 16118, 612),
    ("ITA", 7504, 452),
    ("INSC", 4058, 378),
    ("FRA", 2703, 424),
    ("SCND", 404, 245),
])
def test_table1_spot_values(code, recipes, ingredients):
    r = by_code(code)
    assert (r.recipes, r.ingredients) == (recipes, ingredients)


def test_korea_smallest_usa_largest():
    counts = {r.code: r.recipes for r in REGIONS}
    assert min(counts, key=counts.get) == "KOR"
    assert max(counts, key=counts.get) == "USA"


def test_average_unique_ingredients_about_321():
    avg = sum(r.ingredients for r in REGIONS) / len(REGIONS)
    assert abs(avg - 321) < 2  # paper: "an average of 321 unique ingredients"


@pytest.mark.parametrize("code", ["FRA", "BRI", "SCND"])
def test_dairy_first_regions_boost_dairy(code):
    assert by_code(code).category_boosts.get("Dairy", 1.0) > 1.0


@pytest.mark.parametrize("code", ["INSC", "AFR", "ME", "CBN"])
def test_spice_regions_boost_spice(code):
    assert by_code(code).category_boosts.get("Spice", 1.0) > 1.0

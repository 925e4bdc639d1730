"""Tests for the synthetic integration-scenario generator (substitution S1)."""
import numpy as np
import pandas as pd
import pytest

from repro.scenarios import (
    COUNTRIES,
    LANGUAGES,
    SCENARIOS,
    TWO_DATASET_SCENARIOS,
    ScenarioConfig,
    _drop_word,
    _entity_universe,
    _typo,
    build_scenario,
    load_scenario,
)

ALL = sorted(SCENARIOS)


@pytest.fixture(scope="module")
def small_scenarios(spark):
    """Every named scenario at 30% scale, built once."""
    return {name: load_scenario(spark, name, scale=0.3) for name in ALL}


@pytest.mark.parametrize("name", ALL)
def test_row_counts(small_scenarios, name):
    sc = small_scenarios[name]
    cfg = sc.config
    assert len(sc.pdf_a) == cfg.rows_a
    if cfg.single_table:
        assert sc.pdf_b is None
    else:
        assert len(sc.pdf_b) == cfg.rows_b


@pytest.mark.parametrize("name", ALL)
def test_rid_column_dense(small_scenarios, name):
    sc = small_scenarios[name]
    assert list(sc.pdf_a["rid"]) == list(range(len(sc.pdf_a)))
    if sc.pdf_b is not None:
        assert list(sc.pdf_b["rid"]) == list(range(len(sc.pdf_b)))


@pytest.mark.parametrize("name", [n for n in ALL if not SCENARIOS[n].single_table])
def test_er_gt_matches_config(small_scenarios, name):
    sc = small_scenarios[name]
    assert len(sc.er_gt) == sc.config.n_matches
    for a, b in sc.er_gt:
        assert 0 <= a < len(sc.pdf_a)
        assert 0 <= b < len(sc.pdf_b)


@pytest.mark.parametrize("name", [n for n in ALL if not SCENARIOS[n].single_table])
def test_sm_gt_columns_exist(small_scenarios, name):
    sc = small_scenarios[name]
    for ca, cb in sc.sm_gt:
        assert ca in sc.pdf_a.columns
        assert cb in sc.pdf_b.columns
    # ground truth is 1:1
    assert len({a for a, _ in sc.sm_gt}) == len(sc.sm_gt)
    assert len({b for _, b in sc.sm_gt}) == len(sc.sm_gt)


@pytest.mark.parametrize("name", ALL)
def test_determinism(spark, small_scenarios, name):
    sc2 = load_scenario(spark, name, scale=0.3)
    sc1 = small_scenarios[name]
    pd.testing.assert_frame_equal(sc1.pdf_a, sc2.pdf_a)
    if sc1.pdf_b is not None:
        pd.testing.assert_frame_equal(sc1.pdf_b, sc2.pdf_b)
    assert sc1.er_gt == sc2.er_gt
    assert sc1.sm_gt == sc2.sm_gt


def test_matched_rows_share_entity_content(small_scenarios):
    """DA is low-noise: matched rows agree on most values."""
    sc = small_scenarios["DA"]
    agree = 0
    pairs = sorted(sc.er_gt)[:20]
    col_map = dict(sc.sm_gt)
    for a, b in pairs:
        ra = sc.pdf_a[sc.pdf_a.rid == a].iloc[0]
        rb = sc.pdf_b[sc.pdf_b.rid == b].iloc[0]
        same = sum(
            str(ra[ca]).lower() == str(rb[cb]).lower() for ca, cb in col_map.items()
        )
        agree += same / len(col_map)
    assert agree / len(pairs) > 0.7


def test_merged_column_ag(small_scenarios):
    """AG: brand merged into B's title; brand words appear there."""
    sc = small_scenarios["AG"]
    assert "brand" in sc.pdf_a.columns
    assert not any(c.startswith("brand") for c in sc.pdf_b.columns)
    matched = sorted(sc.er_gt)[:10]
    hits = 0
    for a, b in matched:
        brand = str(sc.pdf_a[sc.pdf_a.rid == a].iloc[0]["brand"]).lower()
        title = str(sc.pdf_b[sc.pdf_b.rid == b].iloc[0]["title"]).lower()
        hits += brand[:4] in title  # typo-tolerant prefix check
    assert hits >= 7


def test_merged_column_bb_on_a_side(small_scenarios):
    sc = small_scenarios["BB"]
    assert not any(c == "brand" for c in sc.pdf_a.columns)
    assert "brewery" in sc.pdf_b.columns


def test_code_columns_and_tm_gt(small_scenarios):
    sc = small_scenarios["IM"]
    gt_cols = set(sc.tm_gt)
    assert ("country", "country") in gt_cols or any("country" in p[0] for p in gt_cols)
    for (ca, cb), pairs in sc.tm_gt.items():
        assert pairs, f"empty TM gt for {(ca, cb)}"
        names = {n for _, n in COUNTRIES} | {n for _, n in LANGUAGES}
        codes = {c for c, _ in COUNTRIES} | {c for c, _ in LANGUAGES}
        for va, vb in pairs:
            assert va.replace("_", " ") in names
            assert vb in codes


def test_renames_applied(small_scenarios):
    sc = small_scenarios["WA"]
    assert "product" in sc.pdf_b.columns
    assert "maker" in sc.pdf_b.columns
    assert ("name", "product") in sc.sm_gt


def test_msd_single_table_duplicates(small_scenarios):
    sc = small_scenarios["MSD"]
    assert sc.pdf_b is None
    for a, b in sc.er_gt:
        assert a < b  # dup index after its source
        assert 0 <= a < len(sc.pdf_a) and b < len(sc.pdf_a)
    assert len(sc.er_gt) > 0


def test_msd_duplicates_are_perturbed_copies(small_scenarios):
    sc = small_scenarios["MSD"]
    a, b = sorted(sc.er_gt)[0]
    ra = sc.pdf_a.iloc[a]
    rb = sc.pdf_a.iloc[b]
    assert ra["year"] == rb["year"]  # numeric fields copied verbatim


def test_typo_and_drop_word_helpers():
    rng = np.random.default_rng(0)
    s = "abcdef"
    for _ in range(20):
        t = _typo(s, rng)
        assert t != "" and abs(len(t) - len(s)) <= 1
    assert _typo("ab", rng) == "ab"  # too short to edit
    assert _drop_word("one", rng) == "one"
    for _ in range(10):
        d = _drop_word("one two three", rng)
        assert len(d.split()) == 2


def test_entity_universe_unique_names():
    rng = np.random.default_rng(1)
    ents = _entity_universe(500, rng, name_words=2)
    assert ents["name"].nunique() == 500
    assert ents["phone"].nunique() == 500


def test_null_rate_applied(spark):
    cfg = ScenarioConfig(
        name="NULLS", rows_a=200, rows_b=200, n_matches=50,
        cols=("name", "brand", "year"), null_rate=0.3, seed=5,
    )
    sc = build_scenario(spark, cfg)
    frac = sc.pdf_a["year"].isna().mean()
    assert 0.2 < frac < 0.4


def test_overlap_ordering_da_highest_ds_lowest(spark, small_scenarios):
    """Relative Table-1 shape: DA has the highest overlap, DS near the lowest."""
    from repro.core.tokenize import cells

    def overlap(sc):
        da = cells(sc.df_a, 0).select("value").distinct()
        db = cells(sc.df_b, 1).select("value").distinct()
        shared = da.join(db, "value").count()
        total = da.union(db).distinct().count()
        return shared / total

    o = {n: overlap(small_scenarios[n]) for n in ("DA", "DS", "WA")}
    assert o["DA"] > o["DS"]
    assert o["DA"] > o["WA"]


def test_two_dataset_roster():
    assert set(TWO_DATASET_SCENARIOS) == set(ALL) - {"MSD"}

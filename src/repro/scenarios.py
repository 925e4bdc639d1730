"""Synthetic data-integration scenarios (substitution S1 in DESIGN.md).

The paper evaluates on 8 public two-dataset ER benchmarks plus a large
single-table dataset (Table 1). Those CSVs are not available offline, so
this module generates *structurally equivalent* scenario pairs from a
deterministic entity universe:

* every entity has a full record (multi-word name, brand, category, city,
  country, language, year, price);
* dataset A presents a subset of entities in a "clean" format;
* dataset B presents ``n_matches`` of A's entities plus fresh ones, under
  per-scenario heterogeneity: column renames, code-vs-name values
  (``US`` ↔ ``united states`` — the Token-Matching ground truth), merged
  columns (brand folded into the name, the paper's BeerAdvo example),
  typos, dropped words, numeric jitter and nulls;
* ER / SM / TM ground truth falls out by construction.

Each named scenario re-parameterises the generator to mirror its Table-1
row's *relative* properties (size ratio, #columns, overlap %, match count)
at reproduction scale (DESIGN.md §5).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

# ---------------------------------------------------------------------------
# vocabulary pools (deterministic, shared by every scenario)
# ---------------------------------------------------------------------------

_SYLLABLES = [
    "ba", "co", "da", "fe", "gi", "ho", "ju", "ka", "lu", "me",
    "no", "pi", "qua", "ri", "sa", "te", "ul", "vo", "wa", "xi",
    "yo", "zu", "bra", "cle", "dri", "flo", "gru", "ple", "sta", "tro",
]


def _word(i: int) -> str:
    """Deterministic pseudo-word #i (3 syllables, ~27 k distinct)."""
    s = _SYLLABLES
    n = len(s)
    return s[i % n] + s[(i // n) % n] + s[(i // (n * n)) % n]


WORDS = [_word(i) for i in range(8000)]
BRANDS = [f"{_word(1000 + 7 * i)}corp" for i in range(60)]
CATEGORIES = [f"{_word(2000 + 11 * i)}ware" for i in range(12)]
CITIES = [f"{_word(3000 + 13 * i)}ton" for i in range(40)]

COUNTRIES = [
    ("us", "united states"), ("uk", "great britain"), ("fr", "france"),
    ("de", "germany"), ("it", "italy"), ("es", "spain"), ("nl", "netherlands"),
    ("dk", "denmark"), ("se", "sweden"), ("no", "norway"), ("fi", "finland"),
    ("pt", "portugal"), ("ie", "ireland"), ("be", "belgium"), ("at", "austria"),
    ("ch", "switzerland"), ("pl", "poland"), ("cz", "czechia"), ("gr", "greece"),
    ("hu", "hungary"), ("jp", "japan"), ("kr", "south korea"), ("br", "brazil"),
    ("ca", "canada"),
]
LANGUAGES = [
    ("en", "english"), ("fr", "french"), ("de", "german"), ("it", "italian"),
    ("es", "spanish"), ("nl", "dutch"), ("da", "danish"), ("sv", "swedish"),
    ("pt", "portuguese"), ("pl", "polish"), ("el", "greek"), ("ja", "japanese"),
    ("ko", "korean"), ("fi", "finnish"), ("no", "norwegian"),
]

FIELDS = (
    "name", "brand", "category", "city", "country", "language", "year",
    "price", "phone", "address",
)


# ---------------------------------------------------------------------------
# configuration
# ---------------------------------------------------------------------------

@dataclass(frozen=True)
class ScenarioConfig:
    """Knobs of one synthetic integration scenario.

    ``cols`` — semantic fields shown by both datasets (A uses the field
    name as column name; B renames per ``renames_b``).
    ``code_cols`` — fields where B shows the *code* while A shows the full
    name (TM ground truth source). ``code_mix`` is the fraction of B rows
    that keep the full name anyway — real open data mixes formats within
    a column, and those rows are the graph bridge that lets embeddings
    relate a code to its name (the §6 TM experiment).
    ``merged`` — optional ``(host_field, guest_field, side)``: on dataset
    ``side`` the guest value is concatenated into the host column and the
    guest column disappears (BeerAdvo-style).
    """

    name: str
    rows_a: int
    rows_b: int
    n_matches: int
    cols: tuple = ("name", "brand", "category", "year")
    renames_b: dict = field(default_factory=dict)
    code_cols: tuple = ()
    code_mix: float = 0.0
    merged: tuple | None = None
    typo_rate: float = 0.0
    word_drop_rate: float = 0.0
    null_rate: float = 0.0
    price_jitter: float = 0.0
    price_mod: float | None = None  # fold price into [0, mod) — ABV-like coarse domain
    name_words: int = 2
    seed: int = 7
    single_table: bool = False
    dup_rate: float = 0.0  # single-table only: fraction of rows that are dups
    mc_pair: tuple = ("brand", "name")  # one-to-many attribute pair for MC tests


@dataclass
class Scenario:
    """Materialised scenario: Spark frames + every ground truth."""

    config: ScenarioConfig
    df_a: DataFrame
    df_b: DataFrame | None
    pdf_a: pd.DataFrame
    pdf_b: pd.DataFrame | None
    er_gt: set  # {(rid_a, rid_b)} — rids of dataset 0/1; single-table: (rid, rid) both in 0
    sm_gt: set  # {(col_a, col_b)}
    tm_gt: dict  # {(col_a, col_b): {(value_a_norm, value_b_norm)}}

    @property
    def name(self) -> str:
        return self.config.name

    @property
    def two_datasets(self) -> bool:
        return self.df_b is not None


# ---------------------------------------------------------------------------
# universe + perturbations
# ---------------------------------------------------------------------------

def _entity_universe(n: int, rng: np.random.Generator, name_words: int) -> pd.DataFrame:
    """Full records for ``n`` entities; names are unique word combos."""
    n_words = len(WORDS)
    # unique name index tuples without replacement
    picks = rng.choice(n_words * n_words, size=n, replace=False)
    names = []
    for p in picks:
        w1, w2 = WORDS[p % n_words], WORDS[(p // n_words) % n_words]
        extra = WORDS[int(rng.integers(0, n_words))]
        if name_words >= 3 and rng.random() < 0.4:
            names.append(f"{w1} {w2} {extra}")
        elif name_words >= 2:
            names.append(f"{w1} {w2}")
        else:
            names.append(w1)
    # Zipf-flavoured brand/category popularity (vocab skew, as in real data)
    def _zipf_choice(pool, size):
        ranks = np.arange(1, len(pool) + 1, dtype=np.float64)
        w = 1.0 / ranks
        w /= w.sum()
        return [pool[i] for i in rng.choice(len(pool), size=size, p=w)]

    return pd.DataFrame(
        {
            "eid": np.arange(n),
            "name": names,
            "brand": _zipf_choice(BRANDS, n),
            "category": _zipf_choice(CATEGORIES, n),
            "city": _zipf_choice(CITIES, n),
            "country": rng.integers(0, len(COUNTRIES), n),
            "language": rng.integers(0, len(LANGUAGES), n),
            "year": rng.integers(1950, 2024, n),
            "price": np.round(rng.random(n) * 500 + 5, 1),
            # unique per entity, like FZ's phone numbers — a high-signal key
            "phone": [f"555{5550000 + 7 * i}" for i in range(n)],
            # distinctive two-word street address (no shared street suffix —
            # a token shared by every row would act as a similarity hub)
            "address": [
                f"{WORDS[int(rng.integers(0, len(WORDS)))]} "
                f"{WORDS[int(rng.integers(0, len(WORDS)))]}"
                for _ in range(n)
            ],
        }
    )


def _typo(s: str, rng: np.random.Generator) -> str:
    """One random character edit (swap / drop / duplicate)."""
    if len(s) < 3:
        return s
    i = int(rng.integers(1, len(s) - 1))
    op = int(rng.integers(0, 3))
    if op == 0:  # swap
        return s[:i] + s[i + 1] + s[i] + s[i + 2:]
    if op == 1:  # drop
        return s[:i] + s[i + 1:]
    return s[:i] + s[i] + s[i:]  # duplicate


def _drop_word(s: str, rng: np.random.Generator) -> str:
    words = s.split()
    if len(words) < 2:
        return s
    k = int(rng.integers(0, len(words)))
    return " ".join(w for i, w in enumerate(words) if i != k)


def _view(
    ents: pd.DataFrame,
    cfg: ScenarioConfig,
    side: str,
    rng: np.random.Generator,
) -> pd.DataFrame:
    """Render entities as one dataset's relation (pre-rename, pre-merge)."""
    out = pd.DataFrame({"rid": np.arange(len(ents))})
    perturbed = side == "b"
    for f in cfg.cols:
        if f in ("country", "language"):
            pool = COUNTRIES if f == "country" else LANGUAGES
            use_code = perturbed and f in cfg.code_cols
            vals = [
                pool[i][0]
                if use_code and not (cfg.code_mix and rng.random() < cfg.code_mix)
                else pool[i][1]
                for i in ents[f]
            ]
        elif f == "price":
            v = ents["price"].to_numpy(dtype=float)
            if cfg.price_mod:
                v = np.round(np.mod(v, cfg.price_mod) + 4.0, 1)
            if perturbed and cfg.price_jitter > 0:
                v = np.round(v * (1 + (rng.random(len(v)) - 0.5) * cfg.price_jitter), 1)
            vals = v
        else:
            vals = ents[f].tolist()
        out[f] = vals
    if perturbed:
        for f in cfg.cols:
            if f in ("year", "price", "country", "language"):
                continue
            col = out[f].astype(str).tolist()
            for i in range(len(col)):
                if cfg.word_drop_rate and rng.random() < cfg.word_drop_rate:
                    col[i] = _drop_word(col[i], rng)
                if cfg.typo_rate and rng.random() < cfg.typo_rate:
                    col[i] = _typo(col[i], rng)
            out[f] = col
    if cfg.null_rate:
        # nulls land on the last listed column (the paper injects them into
        # one attribute, e.g. Year in Figure 3)
        target = cfg.cols[-1]
        mask = rng.random(len(out)) < cfg.null_rate
        out.loc[mask, target] = None
    return out


def _apply_merge_and_rename(
    pdf: pd.DataFrame, cfg: ScenarioConfig, side: str
) -> tuple[pd.DataFrame, dict]:
    """Merge guest-into-host (if this side) and rename columns (side B).

    Returns the frame plus {field: final column name} provenance.
    """
    provenance = {f: f for f in cfg.cols}
    out = pdf.copy()
    if cfg.merged is not None:
        host, guest, merge_side = cfg.merged
        if merge_side == side:
            out[host] = out[guest].astype(str) + " " + out[host].astype(str)
            out = out.drop(columns=[guest])
            provenance.pop(guest)
    if side == "b":
        renames = {f: cfg.renames_b.get(f, f"{f}_b") for f in provenance}
        out = out.rename(columns={f: renames[f] for f in provenance})
        provenance = {f: renames[f] for f in provenance}
    return out, provenance


def _norm(v) -> str:
    """Mirror of tokenize.normalize_value for ground-truth values."""
    return "_".join(str(v).strip().lower().split())


def build_scenario(spark: SparkSession, cfg: ScenarioConfig) -> Scenario:
    """Generate one scenario deterministically from its config."""
    rng = np.random.default_rng(cfg.seed)
    if cfg.single_table:
        return _build_single_table(spark, cfg, rng)
    n_universe = cfg.rows_a + cfg.rows_b  # disjoint tail for B's own entities
    ents = _entity_universe(n_universe, rng, cfg.name_words)
    ents_a = ents.iloc[: cfg.rows_a].reset_index(drop=True)
    ents_b = pd.concat(
        [
            ents.iloc[: cfg.n_matches],  # shared entities
            ents.iloc[cfg.rows_a: cfg.rows_a + cfg.rows_b - cfg.n_matches],
        ]
    ).reset_index(drop=True)
    raw_a = _view(ents_a, cfg, "a", rng)
    raw_b = _view(ents_b, cfg, "b", rng)
    pdf_a, prov_a = _apply_merge_and_rename(raw_a, cfg, "a")
    pdf_b, prov_b = _apply_merge_and_rename(raw_b, cfg, "b")

    er_gt = {(int(i), int(i)) for i in range(cfg.n_matches)}
    # SM ground truth stays 1:1 — a field merged away on one side has no
    # correct counterpart, so it contributes no pair (matching it anyway is
    # a false positive, as in the paper's BeerAdvo discussion).
    sm_gt = {
        (prov_a[f], prov_b[f]) for f in cfg.cols if f in prov_a and f in prov_b
    }
    tm_gt: dict = {}
    for f in cfg.code_cols:
        pool = COUNTRIES if f == "country" else LANGUAGES
        used_a = set(pdf_a[prov_a[f]].dropna().astype(str))
        used_b = set(pdf_b[prov_b[f]].dropna().astype(str))
        pairs = {
            (_norm(name), _norm(code))
            for code, name in pool
            if name in used_a and code in used_b
        }
        tm_gt[(prov_a[f], prov_b[f])] = pairs

    return Scenario(
        config=cfg,
        df_a=spark.createDataFrame(pdf_a),
        df_b=spark.createDataFrame(pdf_b),
        pdf_a=pdf_a,
        pdf_b=pdf_b,
        er_gt=er_gt,
        sm_gt=sm_gt,
        tm_gt=tm_gt,
    )


def _build_single_table(
    spark: SparkSession, cfg: ScenarioConfig, rng: np.random.Generator
) -> Scenario:
    """MSD-style single relation with internal duplicate clusters."""
    n_base = int(cfg.rows_a * (1 - cfg.dup_rate))
    ents = _entity_universe(n_base, rng, cfg.name_words)
    base = _view(ents, cfg, "a", rng)
    n_dups = cfg.rows_a - n_base
    dup_src = rng.integers(0, n_base, n_dups)
    dup_rows = base.iloc[dup_src].copy().reset_index(drop=True)
    # perturb duplicates like a "B side" row
    for f in cfg.cols:
        if f in ("year", "price"):
            continue
        col = dup_rows[f].astype(str).tolist()
        for i in range(len(col)):
            if cfg.typo_rate and rng.random() < cfg.typo_rate:
                col[i] = _typo(col[i], rng)
        dup_rows[f] = col
    pdf = pd.concat([base, dup_rows]).reset_index(drop=True)
    pdf["rid"] = np.arange(len(pdf))
    er_gt = {(int(dup_src[i]), int(n_base + i)) for i in range(n_dups)}
    return Scenario(
        config=cfg,
        df_a=spark.createDataFrame(pdf),
        df_b=None,
        pdf_a=pdf,
        pdf_b=None,
        er_gt=er_gt,
        sm_gt=set(),
        tm_gt={},
    )


# ---------------------------------------------------------------------------
# the 9 named scenarios (Table 1 analogues, reproduction scale per DESIGN §5)
# ---------------------------------------------------------------------------

SCENARIOS: dict[str, ScenarioConfig] = {
    # Fodors-Zagats: tiny, highest overlap of the small pairs, easy matches
    "FZ": ScenarioConfig(
        name="FZ", rows_a=200, rows_b=160, n_matches=55,
        cols=("name", "address", "city", "category", "phone", "price"),
        renames_b={"name": "restaurant", "address": "addr", "city": "location",
                   "category": "cuisine", "phone": "tel", "price": "cost"},
        typo_rate=0.05, mc_pair=("category", "name"), seed=11,
    ),
    # Amazon-Google: 3 columns, brand folded into product title on B
    "AG": ScenarioConfig(
        name="AG", rows_a=360, rows_b=340, n_matches=120,
        cols=("name", "brand", "price"),
        renames_b={"name": "title", "price": "cost"},
        merged=("name", "brand", "b"), typo_rate=0.10, price_jitter=0.08,
        name_words=3, seed=13,
    ),
    # Walmart-Amazon: 5 columns, low overlap (heavier noise)
    "WA": ScenarioConfig(
        name="WA", rows_a=500, rows_b=500, n_matches=60,
        cols=("name", "brand", "category", "price", "year"),
        renames_b={"name": "product", "brand": "maker", "category": "type",
                   "price": "cost", "year": "released"},
        typo_rate=0.22, word_drop_rate=0.15, price_jitter=0.10,
        name_words=3, seed=17,
    ),
    # Itunes-Amazon: widest small schema (8 cols), few matches
    "IA": ScenarioConfig(
        name="IA", rows_a=550, rows_b=550, n_matches=25,
        cols=("name", "brand", "category", "city", "country", "language", "year", "price"),
        renames_b={"name": "song", "brand": "artist", "category": "genre",
                   "city": "label", "price": "cost"},
        code_cols=("language",), typo_rate=0.15, word_drop_rate=0.10,
        name_words=3, seed=19,
    ),
    # DBLP-ACM: near-identical formats → very high overlap
    "DA": ScenarioConfig(
        name="DA", rows_a=450, rows_b=450, n_matches=200,
        cols=("name", "brand", "city", "year"),
        typo_rate=0.02, name_words=3, seed=23,
    ),
    # DBLP-Scholar: same shape as DA but heavy noise → ~2 % overlap
    "DS": ScenarioConfig(
        name="DS", rows_a=600, rows_b=600, n_matches=120,
        cols=("name", "brand", "city", "year"),
        renames_b={"name": "t", "brand": "a", "city": "v", "year": "y"},
        typo_rate=0.25, word_drop_rate=0.20, name_words=3, seed=29,
    ),
    # BeerAdvo-RateBeer: brewery name folded into beer name on A; price
    # plays ABV's role (a near-unique numeric both sides agree on)
    "BB": ScenarioConfig(
        name="BB", rows_a=350, rows_b=350, n_matches=40,
        cols=("name", "brand", "category", "price"),
        renames_b={"name": "beer", "brand": "brewery", "category": "style", "price": "abv"},
        merged=("name", "brand", "a"), typo_rate=0.08, word_drop_rate=0.15,
        name_words=3, price_mod=6.0, mc_pair=("category", "name"), seed=31,
    ),
    # IMDB-MovieLens: the wide scenario; country+language code columns (TM)
    "IM": ScenarioConfig(
        name="IM", rows_a=600, rows_b=600, n_matches=150,
        cols=("name", "brand", "category", "city", "country", "language", "year", "price"),
        renames_b={"name": "title", "brand": "director", "category": "genre",
                   "city": "studio", "price": "rating"},
        code_cols=("country", "language"), code_mix=0.25,
        typo_rate=0.08, word_drop_rate=0.05,
        name_words=3, seed=37,
    ),
    # Million Songs: large single table with duplicate clusters
    "MSD": ScenarioConfig(
        name="MSD", rows_a=3000, rows_b=0, n_matches=0,
        cols=("name", "brand", "category", "year", "price"),
        typo_rate=0.10, single_table=True, dup_rate=0.35, name_words=2,
        seed=41,
    ),
}

TWO_DATASET_SCENARIOS = [k for k, v in SCENARIOS.items() if not v.single_table]


def load_scenario(spark: SparkSession, name: str, scale: float = 1.0) -> Scenario:
    """Build a named scenario, optionally scaled down (``scale < 1``) for tests."""
    cfg = SCENARIOS[name]
    if scale != 1.0:
        cfg = ScenarioConfig(
            **{
                **cfg.__dict__,
                "rows_a": max(20, int(cfg.rows_a * scale)),
                "rows_b": 0 if cfg.single_table else max(20, int(cfg.rows_b * scale)),
                "n_matches": max(5, int(cfg.n_matches * scale)) if not cfg.single_table else 0,
            }
        )
    return build_scenario(spark, cfg)

"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# IDEA-paper workloads: tweet stream + reference datasets (paper § 7, appendix)
# ---------------------------------------------------------------------------
# Paper cardinalities at ref_scale=1.0. Tests use ref_scale=0.01, benchmarks
# ref_scale=0.1 — shapes depend on relative sizes (DESIGN.md § 3). The
# Persons dataset is substituted: 1e9 rows in the paper, 1e6 here at scale 1.
PAPER_CARDINALITY = {
    "safety_ratings": 500_000,
    "religious_populations": 500_000,
    "suspects_names": 5_000,
    "monuments": 500_000,
    "religious_buildings": 10_000,
    "facilities": 50_000,
    "sensitive_names": 1_000_000,
    "district_areas": 500,
    "average_incomes": 500,
    "persons": 1_000_000,  # substituted from 1e9 (DESIGN.md § 3)
    "attack_events": 5_000,
    "sensitive_words": 10_000,
}

N_COUNTRIES = 500          # tweet/reference country-code domain
N_RELIGIONS = 20
FACILITY_TYPES = [
    "school", "hospital", "airport", "stadium", "mall",
    "station", "museum", "park", "port", "plant",
]
ETHNICITIES = ["eth_%02d" % i for i in range(12)]
WORLD = 180.0              # coordinates are uniform in [0, WORLD) degrees


def _countries(k: int = N_COUNTRIES) -> list:
    return ["C%05d" % i for i in range(k)]


def _religions(k: int = N_RELIGIONS) -> list:
    return ["religion_%02d" % i for i in range(k)]


def _scaled(name: str, ref_scale: float) -> int:
    return max(1, int(PAPER_CARDINALITY[name] * ref_scale))


def _names(g: np.random.Generator, n: int) -> np.ndarray:
    """Synthetic person names — short so edit-distance joins have matches."""
    syll = np.array(["an", "bo", "ci", "da", "el", "fu", "go", "hi", "jo",
                     "ka", "lu", "mi", "no", "pa", "qi", "ro", "su", "ti"])
    parts = syll[g.integers(0, len(syll), (n, 3))]
    return np.char.add(np.char.add(parts[:, 0], parts[:, 1]), parts[:, 2])


def tweets_pdf(n: int, *, seed: int = 7, start_id: int = 0,
               zipf_alpha: float = 1.05) -> pd.DataFrame:
    """``n`` synthetic tweets as a pandas frame (the feed's parsed form).

    Columns mirror the paper's open TweetType plus the fields its UDFs
    touch: country (zipfian over the shared country domain), user names,
    a location in the shared coordinate world, and a creation timestamp.
    The ``text`` is padded so a serialized record is ~450 bytes (§ 7.1).
    """
    g = _rng(seed + start_id)
    countries = np.array(_countries())
    ranks = np.arange(1, len(countries) + 1)
    w = 1.0 / ranks ** zipf_alpha
    w /= w.sum()
    words = np.array(["alpha", "bravo", "delta", "echo", "light", "storm",
                      "bomb", "river", "cloud", "stone", "ember", "night"])
    text_words = words[g.integers(0, len(words), (n, 40))]
    texts = [" ".join(row) for row in text_words]
    screen = _names(g, n)
    # sprinkle special characters for removeSpecial() to strip
    deco = np.array(["", "_", ".", "@", "!"])
    screen = np.char.add(screen, deco[g.integers(0, len(deco), n)])
    return pd.DataFrame(
        {
            "id": np.arange(start_id, start_id + n, dtype="int64"),
            "text": texts,
            "country": g.choice(countries, n, p=w),
            "user_screen_name": screen,
            "user_name": _names(g, n),
            "latitude": (g.random(n) * WORLD).round(6),
            "longitude": (g.random(n) * WORLD).round(6),
            "created_at": pd.to_datetime("2019-01-01")
            + pd.to_timedelta(g.integers(0, 180 * 24 * 3600, n), unit="s"),
        }
    )


def safety_ratings_pdf(*, ref_scale: float = 0.01, seed: int = 11) -> pd.DataFrame:
    """SafetyRatings(country_code PK, safety_rating) — paper 500K × 74 B.

    Only ``N_COUNTRIES`` codes join with tweets; the rest pad cardinality
    to the paper's ref size so scan/build costs are faithful.
    """
    n = _scaled("safety_ratings", ref_scale)
    g = _rng(seed)
    codes = ["C%05d" % i for i in range(n)]
    return pd.DataFrame(
        {
            "country_code": codes,
            "safety_rating": g.choice(["A", "B", "C", "D", "E"], n),
        }
    )


def religious_populations_pdf(*, ref_scale: float = 0.01, seed: int = 12) -> pd.DataFrame:
    """ReligiousPopulations(rid PK, country_name, religion_name, population)."""
    n = _scaled("religious_populations", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "rid": ["r%07d" % i for i in range(n)],
            "country_name": g.choice(_countries(), n),
            "religion_name": g.choice(_religions(), n),
            "population": g.integers(1_000, 10_000_000, n),
        }
    )


def suspects_names_pdf(*, ref_scale: float = 0.01, seed: int = 13) -> pd.DataFrame:
    """SuspectsNames / SensitiveNamesDataset(sensitiveName, religionName) — 5K × 150 B."""
    n = _scaled("suspects_names", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "suspect_id": ["s%06d" % i for i in range(n)],
            "sensitive_name": _names(g, n),
            "religion_name": g.choice(_religions(), n),
        }
    )


def monuments_pdf(*, ref_scale: float = 0.01, seed: int = 14) -> pd.DataFrame:
    """MonumentList(monument_id PK, lat/lon point) — paper 500K × 94 B."""
    n = _scaled("monuments", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "monument_id": ["m%07d" % i for i in range(n)],
            "monument_lat": (g.random(n) * WORLD).round(6),
            "monument_lon": (g.random(n) * WORLD).round(6),
        }
    )


def religious_buildings_pdf(*, ref_scale: float = 0.01, seed: int = 15) -> pd.DataFrame:
    """ReligiousBuildings(id PK, religion_name, location, registered_believer)."""
    n = _scaled("religious_buildings", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "religious_building_id": ["b%06d" % i for i in range(n)],
            "religion_name": g.choice(_religions(), n),
            "building_lat": (g.random(n) * WORLD).round(6),
            "building_lon": (g.random(n) * WORLD).round(6),
            "registered_believer": g.integers(10, 100_000, n),
        }
    )


def facilities_pdf(*, ref_scale: float = 0.01, seed: int = 16) -> pd.DataFrame:
    """Facilities(facility_id PK, location, facility_type) — 50K × 142 B."""
    n = _scaled("facilities", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "facility_id": ["f%06d" % i for i in range(n)],
            "facility_lat": (g.random(n) * WORLD).round(6),
            "facility_lon": (g.random(n) * WORLD).round(6),
            "facility_type": g.choice(FACILITY_TYPES, n),
        }
    )


def sensitive_names_pdf(*, ref_scale: float = 0.01, seed: int = 17) -> pd.DataFrame:
    """SensitiveNames(suspicious_name_id PK, name, religion, threat_level) — 1M × 99 B."""
    n = _scaled("sensitive_names", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "suspicious_name_id": ["n%08d" % i for i in range(n)],
            "suspicious_name": _names(g, n),
            "religion_name": g.choice(_religions(), n),
            "threat_level": g.integers(1, 11, n),
        }
    )


def district_areas_pdf(*, ref_scale: float = 1.0, seed: int = 18) -> pd.DataFrame:
    """DistrictAreas(district_area_id PK, rectangle) — a disjoint grid tiling.

    The paper's districts partition the area a tweet can fall in; a
    ``ceil(sqrt(n))``-square grid over the coordinate world keeps the
    point-in-rectangle join ~1:1 like the paper's.
    """
    n = _scaled("district_areas", ref_scale)
    side = int(np.ceil(np.sqrt(n)))
    cell = WORLD / side
    ids, xlo, ylo = [], [], []
    for i in range(n):
        r, c = divmod(i, side)
        ids.append("d%05d" % i)
        xlo.append(c * cell)
        ylo.append(r * cell)
    return pd.DataFrame(
        {
            "district_area_id": ids,
            "x_lo": np.round(xlo, 6),
            "y_lo": np.round(ylo, 6),
            "x_hi": np.round(np.array(xlo) + cell, 6),
            "y_hi": np.round(np.array(ylo) + cell, 6),
        }
    )


def average_incomes_pdf(*, ref_scale: float = 1.0, seed: int = 19) -> pd.DataFrame:
    """AverageIncomes(district_area_id PK, average_income) — one per district."""
    d = district_areas_pdf(ref_scale=ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "district_area_id": d["district_area_id"],
            "average_income": (g.random(len(d)) * 90_000 + 10_000).round(2),
        }
    )


def persons_pdf(*, ref_scale: float = 0.01, seed: int = 20) -> pd.DataFrame:
    """Persons/Residents(person_id PK, ethnicity, location) — substituted scale."""
    n = _scaled("persons", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "person_id": ["p%09d" % i for i in range(n)],
            "ethnicity": g.choice(ETHNICITIES, n),
            "person_lat": (g.random(n) * WORLD).round(6),
            "person_lon": (g.random(n) * WORLD).round(6),
        }
    )


def attack_events_pdf(*, ref_scale: float = 0.01, seed: int = 21) -> pd.DataFrame:
    """AttackEvents(attack_record_id PK, datetime, location, related_religion)."""
    n = _scaled("attack_events", ref_scale)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "attack_record_id": ["a%06d" % i for i in range(n)],
            "attack_datetime": pd.to_datetime("2018-10-01")
            + pd.to_timedelta(g.integers(0, 270 * 24 * 3600, n), unit="s"),
            "attack_lat": (g.random(n) * WORLD).round(6),
            "attack_lon": (g.random(n) * WORLD).round(6),
            "related_religion": g.choice(_religions(), n),
        }
    )


def sensitive_words_pdf(*, ref_scale: float = 0.01, seed: int = 22) -> pd.DataFrame:
    """SensitiveWords(country, word) — the motivating UDF-2 reference set."""
    n = _scaled("sensitive_words", ref_scale)
    g = _rng(seed)
    words = ["alpha", "bravo", "delta", "echo", "light", "storm",
             "bomb", "river", "cloud", "stone", "ember", "night"]
    return pd.DataFrame(
        {
            "word_id": ["w%06d" % i for i in range(n)],
            "country": g.choice(_countries(), n),
            "word": g.choice(words, n),
        }
    )


# name -> (generator, primary key) for every reference dataset a UDF uses
REFERENCE_GENERATORS = {
    "safety_ratings": (safety_ratings_pdf, "country_code"),
    "religious_populations": (religious_populations_pdf, "rid"),
    "suspects_names": (suspects_names_pdf, "suspect_id"),
    "monuments": (monuments_pdf, "monument_id"),
    "religious_buildings": (religious_buildings_pdf, "religious_building_id"),
    "facilities": (facilities_pdf, "facility_id"),
    "sensitive_names": (sensitive_names_pdf, "suspicious_name_id"),
    "district_areas": (district_areas_pdf, "district_area_id"),
    "average_incomes": (average_incomes_pdf, "district_area_id"),
    "persons": (persons_pdf, "person_id"),
    "attack_events": (attack_events_pdf, "attack_record_id"),
    "sensitive_words": (sensitive_words_pdf, "word_id"),
}

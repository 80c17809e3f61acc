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


_N_FLIGHTS_PER_SF = 6_000_000

#: (code, frequency weight, base mean delay (min), departure-time slope).
#: Rare regional carriers have the largest mean delays and the strongest
#: departure-time effect — this reproduces the FLIGHTS features the paper's
#: results hinge on: sparse groups bottleneck GROUP BY queries (active
#: scanning), sparse groups see few outliers (RangeTrim), and later
#: departures spread the airline means apart (F-q3).
FLIGHT_AIRLINES = [
    ("WN", 18.0, 11.0, 8.0),
    ("AA", 15.0, 9.0, 10.0),
    ("DL", 13.0, 7.5, 12.0),
    ("UA", 11.0, 10.5, 9.0),
    ("US", 9.0, 8.0, 1.0),
    ("NW", 7.0, 0.5, 0.0),
    ("CO", 6.0, 10.0, 9.0),
    ("MQ", 5.0, 13.0, 8.0),
    ("OO", 4.0, 15.0, 9.0),
    ("XE", 3.5, 17.0, 10.0),
    ("YV", 3.0, 24.0, 12.0),
    ("HP", 2.5, 12.0, 5.0),
    ("F9", 2.0, 28.0, 14.0),
    ("HA", 1.5, 52.0, 10.0),
]

_N_AIRPORTS = 60
#: Airports with a strongly negative additive delay offset — their average
#: departure delay comes out negative (the F-q5 answer set). They are given
#: low Zipf ranks (sparse) so F-q5 is bottlenecked on sparse groups, the
#: regime where the paper's active scanning shines (Table 6).
_NEGATIVE_OFFSET_AIRPORTS = {37: -20.0, 41: -21.5, 46: -19.0, 52: -22.5, 57: -24.0}
_ORD_IDX = 1  # dense airport with a high positive offset (F-q1 / F-q4 / F-q8)

FLIGHT_DELAY_MIN = -60.0  # physical floor: flights leave at most 60 min early


def _airport_table(rng: np.random.Generator):
    """Deterministic airport codes, Zipf weights, and delay offsets."""
    codes = []
    for i in range(_N_AIRPORTS):
        c1, c2, c3 = i // 26, i % 26, (7 * i + 3) % 26
        codes.append(chr(65 + c1) + chr(65 + c2) + chr(65 + c3))
    codes[_ORD_IDX] = "ORD"
    ranks = np.arange(1, _N_AIRPORTS + 1, dtype=np.float64)
    weights = 1.0 / ranks**1.05
    weights /= weights.sum()
    # Positive offsets stay >= 3.3 so every non-negative airport's mean
    # sits well above zero (the F-q5 threshold is resolvable without a
    # full per-group scan at reproduction scale), and <= 12 so ORD
    # (offset 18) is the clear F-q8 winner.
    offsets = rng.uniform(3.3, 9.0, _N_AIRPORTS)
    offsets[_ORD_IDX] = 18.0
    for idx, off in _NEGATIVE_OFFSET_AIRPORTS.items():
        offsets[idx] = off
    return codes, weights, offsets


def flights(spark: SparkSession, *, sf: float = 0.01, seed: int = 7) -> DataFrame:
    """Synthetic FLIGHTS-lite table (paper Table 3 substitute).

    Columns mirror the attributes the paper extracts from the public
    FLIGHTS dataset: Origin (airport), Airline (carrier), DepDelay
    (minutes, the aggregated measure), DepTime (minutes after midnight),
    DayOfWeek (1-7). SF=1.0 is ~6 M rows (the paper used 606 M).

    DepDelay = airline base + airport offset + day-of-week effect +
    airline-specific departure-time slope + Gaussian noise, plus a rare
    exponential outlier tail (~3 per 10k rows) that stretches the global
    MAX to several hundred minutes. The catalog range bounds (true
    MIN/MAX) are therefore far wider than any one group's effective
    range, which is precisely the regime where the paper's PMA/PHOS
    pathologies bite and RangeTrim pays off.
    """
    n = max(1, int(_N_FLIGHTS_PER_SF * sf))
    g = _rng(seed)

    air_w = np.array([w for _, w, _, _ in FLIGHT_AIRLINES])
    air_w = air_w / air_w.sum()
    air_idx = g.choice(len(FLIGHT_AIRLINES), n, p=air_w)
    air_base = np.array([b for _, _, b, _ in FLIGHT_AIRLINES])[air_idx]
    air_slope = np.array([s for _, _, _, s in FLIGHT_AIRLINES])[air_idx]
    airline = np.array([c for c, _, _, _ in FLIGHT_AIRLINES])[air_idx]

    codes, ap_w, ap_off = _airport_table(_rng(seed + 1))
    ap_idx = g.choice(_N_AIRPORTS, n, p=ap_w)
    origin = np.array(codes)[ap_idx]

    dow = g.integers(1, 8, n)
    dow_eff = np.array([0.0, -15.0, -10.0, -5.0, 0.0, 5.0, 10.0, 15.0])[dow]

    dep_time = g.integers(300, 1440, n)  # 05:00 .. 23:59
    t_frac = (dep_time - 300.0) / 1140.0

    noise = g.normal(0.0, 18.0, n)
    # Rare heavy tail, truncated at +600: stretches the catalog MAX far
    # beyond any group's effective range without making per-group means
    # unestimable at reproduction scale.
    outlier = (g.random(n) < 5e-5) * np.minimum(g.exponential(180.0, n), 600.0)
    delay = (
        air_base
        + ap_off[ap_idx]
        + dow_eff
        + air_slope * (t_frac - 0.5) * 2.0
        + noise
        + outlier
    )
    delay = np.maximum(delay, FLIGHT_DELAY_MIN).round(2)

    pdf = pd.DataFrame(
        {
            "Origin": origin,
            "Airline": airline,
            "DepDelay": delay,
            "DepTime": dep_time.astype("int64"),
            "DayOfWeek": dow.astype("int64"),
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

"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.

Extensions for the nested TPC-H benchmark of "Scalable Querying of
Nested Data" (App. B):

* ``nation`` / ``region`` tables (the two deepest grouping levels);
* a ``skew`` parameter on ``lineitem``/``orders`` emulating the skewed
  TPC-H generator [53]: skew factor ``z`` ∈ 0..4 draws ``l_orderkey``,
  ``l_partkey`` and ``o_custkey`` from a Zipf-like distribution with
  exponent ``0.5·z`` (z=0 ⇒ uniform, z=4 ⇒ few heavy keys at very
  high frequency), which skews both inner-collection cardinalities
  and the join key into ``part``;
* name attributes (``o_orderdate`` exists; ``c_name``, ``p_name``,
  ``n_name``, ``r_name``) used by the narrow query variants, plus
  filler ``*_comment`` attributes exercising the wide variants.
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


def _zipf_or_uniform(
    g: np.random.Generator, n: int, n_keys: int, skew: float
) -> np.ndarray:
    """Keys in [1, n_keys]; Zipf exponent 0.5·skew (uniform at skew=0)."""
    if skew <= 0:
        return g.integers(1, n_keys + 1, n)
    ranks = np.arange(1, n_keys + 1)
    w = 1.0 / ranks ** (0.5 * skew)
    w /= w.sum()
    return g.choice(ranks, size=n, p=w)


def lineitem(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    seed: int = 0,
    skew: float = 0.0,
) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": _zipf_or_uniform(g, n, n_orders, skew),
            "l_partkey": _zipf_or_uniform(g, n, n_part, skew),
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


def orders(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    seed: int = 1,
    skew: float = 0.0,
) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": _zipf_or_uniform(g, n, n_cust, skew),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": (
                pd.to_datetime("1992-01-01")
                + pd.to_timedelta(g.integers(0, 2406, n), unit="D")
            ).strftime("%Y-%m-%d"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
            "o_comment": np.array(
                ["order-comment-" + "x" * 40] * n, dtype=object
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
            "p_name": np.array([f"part#{i}" for i in range(1, n + 1)]),
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
            "c_name": np.array([f"Customer#{i:09d}" for i in range(1, n + 1)]),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
            "c_comment": np.array(
                ["customer-comment-" + "y" * 40] * n, dtype=object
            ),
        }
    )
    return spark.createDataFrame(pdf)


_NATIONS = [
    ("ALGERIA", 0), ("ARGENTINA", 1), ("BRAZIL", 1), ("CANADA", 1),
    ("EGYPT", 4), ("ETHIOPIA", 0), ("FRANCE", 3), ("GERMANY", 3),
    ("INDIA", 2), ("INDONESIA", 2), ("IRAN", 4), ("IRAQ", 4),
    ("JAPAN", 2), ("JORDAN", 4), ("KENYA", 0), ("MOROCCO", 0),
    ("MOZAMBIQUE", 0), ("PERU", 1), ("CHINA", 2), ("ROMANIA", 3),
    ("SAUDI ARABIA", 4), ("VIETNAM", 2), ("RUSSIA", 3),
    ("UNITED KINGDOM", 3), ("UNITED STATES", 1),
]
_REGIONS = ["AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST"]


def nation(spark: SparkSession) -> DataFrame:
    """The 25 TPC-H nations (fixed, scale-independent)."""
    pdf = pd.DataFrame(
        {
            "n_nationkey": np.arange(0, 25),
            "n_name": [n for n, _ in _NATIONS],
            "n_regionkey": [r for _, r in _NATIONS],
            "n_comment": ["nation-comment-" + "z" * 40] * 25,
        }
    )
    return spark.createDataFrame(pdf)


def region(spark: SparkSession) -> DataFrame:
    """The 5 TPC-H regions (fixed, scale-independent)."""
    pdf = pd.DataFrame(
        {
            "r_regionkey": np.arange(0, 5),
            "r_name": _REGIONS,
            "r_comment": ["region-comment-" + "w" * 40] * 5,
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

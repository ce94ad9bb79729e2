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
# QR2 web-database substitutes (DESIGN.md section 3).
#
# ``diamonds_pdf``/``houses_pdf`` are the ground-truth hidden tables as
# pandas frames (deterministic in ``seed``); ``diamonds``/``houses`` wrap
# them as Spark DataFrames. Tuple counts stand in for scale factor: tests
# use n~500, benchmarks n~5000-20000.
# ---------------------------------------------------------------------------

#: fraction of diamonds with LengthWidthRatio exactly 1.0 — the paper reports
#: "around 20% of the tuples satisfy this predicate" on the live Blue Nile.
DIAMONDS_LWR_ONE_FRACTION = 0.2

DIAMOND_CUTS = ["Astor", "Ideal", "Very Good", "Good"]
DIAMOND_COLORS = list("DEFGHIJ")
DIAMOND_CLARITIES = ["FL", "IF", "VVS1", "VVS2", "VS1", "VS2", "SI1", "SI2"]
DIAMOND_SHAPES = ["Round", "Princess", "Emerald", "Cushion", "Oval", "Pear"]


def diamonds_pdf(*, n: int, seed: int = 7) -> pd.DataFrame:
    """Synthetic Blue Nile inventory.

    Marginals mimic the live site: carat lognormal; price a noisy power law
    of carat (strong positive correlation); depth/table tight normals; and a
    20% spike of tuples with lwr == 1.0 (round stones), reproducing the
    paper's worst-case dense region. Prices are rounded to whole dollars so
    duplicate values (general-positioning violations) occur naturally.
    """
    g = _rng(seed)
    carat = np.round(np.exp(g.normal(-0.4, 0.55, n)).clip(0.2, 10.0), 2)
    price = np.round(1800.0 * carat**1.9 * np.exp(g.normal(0, 0.25, n)), 0)
    depth = np.round(g.normal(61.8, 1.4, n).clip(55, 68), 1)
    table_pct = np.round(g.normal(57.5, 2.0, n).clip(50, 66), 1)
    lwr = np.round(g.uniform(1.01, 2.35, n), 2)
    lwr[g.random(n) < DIAMONDS_LWR_ONE_FRACTION] = 1.0
    return pd.DataFrame(
        {
            "tid": np.arange(1, n + 1),
            "price": price,
            "carat": carat,
            "depth": depth,
            "table_pct": table_pct,
            "lwr": lwr,
            "cut": g.choice(DIAMOND_CUTS, n, p=[0.1, 0.45, 0.3, 0.15]),
            "color": g.choice(DIAMOND_COLORS, n),
            "clarity": g.choice(DIAMOND_CLARITIES, n),
            "shape": g.choice(DIAMOND_SHAPES, n, p=[0.5, 0.14, 0.1, 0.1, 0.08, 0.08]),
        }
    )


def diamonds(spark: SparkSession, *, n: int, seed: int = 7) -> DataFrame:
    """Spark view of :func:`diamonds_pdf`."""
    return spark.createDataFrame(diamonds_pdf(n=n, seed=seed))


HOUSE_ZIPS = ["76010", "76011", "76012", "76013", "75001", "75002", "75080", "75201"]


def houses_pdf(*, n: int, seed: int = 11) -> pd.DataFrame:
    """Synthetic Zillow listings.

    sqft is derived from price with multiplicative noise, giving the strong
    positive price-sqft correlation the paper's best-case function
    (price + squarefeet) relies on. Prices rounded to $100, sqft to 10.
    """
    g = _rng(seed)
    price = np.round(np.exp(g.normal(12.6, 0.45, n)).clip(4e4, 4e6), -2)
    sqft = np.round((price / 160.0) * np.exp(g.normal(0, 0.18, n)), -1).clip(300, 20000)
    beds = np.minimum(1 + g.poisson(1.8, n), 7)
    baths = np.round((1 + g.poisson(1.1, n)).clip(1, 5) / 1.0, 1)
    return pd.DataFrame(
        {
            "tid": np.arange(1, n + 1),
            "price": price,
            "sqft": sqft,
            "beds": beds.astype("int64"),
            "baths": baths,
            "zipcode": g.choice(HOUSE_ZIPS, n),
        }
    )


def houses(spark: SparkSession, *, n: int, seed: int = 11) -> DataFrame:
    """Spark view of :func:`houses_pdf`."""
    return spark.createDataFrame(houses_pdf(n=n, seed=seed))

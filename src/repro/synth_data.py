"""Synthetic OLAP data at a configurable scale factor (TPC-H-lite).

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.

Two layers:

* ``*_pdf(sf, seed)`` — pandas generators. The engine substrate, the
  DuckDB oracle and fast unit tests consume these directly.
* ``lineitem(spark, ...)`` etc. — Spark wrappers over the pandas
  generators, used by the real-SparkSQL baseline and the Spark jobs.

All eight TPC-H tables are provided (lineitem, orders, customer, part,
supplier, partsupp, nation, region) with the column subset needed by the
reproduced queries (Q1,3,5,6,7,8,9,10,12,14). See DESIGN.md §5 for the
documented predicate substitutions.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000
_N_SUPPLIER_PER_SF = 10_000
_N_PARTSUPP_PER_SF = 800_000

#: The 25 TPC-H nations and their region keys (AFRICA, AMERICA, ASIA,
#: EUROPE, MIDDLE EAST = 0..4), verbatim from the TPC-H spec.
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
_P_TYPES = ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"]
_SHIP_MODES = ["REG AIR", "AIR", "RAIL", "SHIP", "TRUCK", "MAIL", "FOB"]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _n(per_sf: int, sf: float) -> int:
    return max(1, int(per_sf * sf))


# ---------------------------------------------------------------------------
# pandas generators
# ---------------------------------------------------------------------------

def lineitem_pdf(*, sf: float = 0.01, seed: int = 0) -> pd.DataFrame:
    """Fact table. Keys reference orders/part/supplier at the same ``sf``."""
    n = _n(_N_LINEITEM_PER_SF, sf)
    n_orders = _n(_N_ORDERS_PER_SF, sf)
    n_part = _n(_N_PART_PER_SF, sf)
    n_supp = _n(_N_SUPPLIER_PER_SF, sf)
    g = _rng(seed)
    shipdate = pd.to_datetime("1992-01-01") + pd.to_timedelta(
        g.integers(0, 2557, n), unit="D"
    )
    commit_delta = g.integers(-30, 60, n)
    receipt_delta = g.integers(1, 30, n)
    partkey = g.integers(1, n_part + 1, n)
    # As in TPC-H, (l_partkey, l_suppkey) is drawn from partsupp: the
    # supplier is one of the part's suppliers (see partsupp_pdf's stride
    # formula), so Q9's lineitem ⋈ partsupp join has TPC-H selectivity.
    per_part = max(1, min(4, n_supp))
    offs = g.integers(0, per_part, n)
    suppkey = ((partkey * 13 + offs * (n_supp // per_part + 1)) % n_supp) + 1
    # datetime64[us]: maps to plain TIMESTAMP in DuckDB/Arrow (TIMESTAMP_NS
    # cannot be compared to DATE literals in DuckDB 1.0).
    shipdate = shipdate.astype("datetime64[us]")
    return pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": partkey,
            "l_suppkey": suppkey,
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": shipdate,
            "l_commitdate": (
                shipdate + pd.to_timedelta(commit_delta, unit="D")
            ).astype("datetime64[us]"),
            "l_receiptdate": (
                shipdate + pd.to_timedelta(receipt_delta, unit="D")
            ).astype("datetime64[us]"),
            "l_shipmode": g.choice(_SHIP_MODES, n),
        }
    )


def orders_pdf(*, sf: float = 0.01, seed: int = 1) -> pd.DataFrame:
    n = _n(_N_ORDERS_PER_SF, sf)
    n_cust = _n(_N_CUSTOMER_PER_SF, sf)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": (
                pd.to_datetime("1992-01-01")
                + pd.to_timedelta(g.integers(0, 2406, n), unit="D")
            ).astype("datetime64[us]"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
            "o_shippriority": np.zeros(n, dtype="int64"),
        }
    )


def customer_pdf(*, sf: float = 0.01, seed: int = 2) -> pd.DataFrame:
    n = _n(_N_CUSTOMER_PER_SF, sf)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )


def part_pdf(*, sf: float = 0.01, seed: int = 5) -> pd.DataFrame:
    n = _n(_N_PART_PER_SF, sf)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(_P_TYPES, n),
            "p_brand": g.choice(
                [f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n
            ),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )


def supplier_pdf(*, sf: float = 0.01, seed: int = 6) -> pd.DataFrame:
    n = _n(_N_SUPPLIER_PER_SF, sf)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "s_suppkey": np.arange(1, n + 1),
            "s_nationkey": g.integers(0, 25, n),
            "s_acctbal": (g.random(n) * 10000 - 1000).round(2),
        }
    )


def partsupp_pdf(*, sf: float = 0.01, seed: int = 7) -> pd.DataFrame:
    """Each (partkey, suppkey) pair appears at most once, as in TPC-H."""
    n_part = _n(_N_PART_PER_SF, sf)
    n_supp = _n(_N_SUPPLIER_PER_SF, sf)
    per_part = max(1, min(4, n_supp))
    g = _rng(seed)
    partkey = np.repeat(np.arange(1, n_part + 1), per_part)
    # Distinct suppliers per part: a deterministic stride pattern.
    offs = np.tile(np.arange(per_part), n_part)
    suppkey = ((partkey * 13 + offs * (n_supp // per_part + 1)) % n_supp) + 1
    return pd.DataFrame(
        {
            "ps_partkey": partkey,
            "ps_suppkey": suppkey,
            "ps_availqty": g.integers(1, 10000, len(partkey)),
            "ps_supplycost": (g.random(len(partkey)) * 1000 + 1).round(2),
        }
    )


def nation_pdf(**_: object) -> pd.DataFrame:
    return pd.DataFrame(
        {
            "n_nationkey": np.arange(25),
            "n_name": [n for n, _ in _NATIONS],
            "n_regionkey": np.array([r for _, r in _NATIONS], dtype="int64"),
        }
    )


def region_pdf(**_: object) -> pd.DataFrame:
    return pd.DataFrame(
        {"r_regionkey": np.arange(5), "r_name": _REGIONS}
    )


#: name -> pandas generator, for "give me the whole database" call sites.
PDF_GENERATORS = {
    "lineitem": lineitem_pdf,
    "orders": orders_pdf,
    "customer": customer_pdf,
    "part": part_pdf,
    "supplier": supplier_pdf,
    "partsupp": partsupp_pdf,
    "nation": nation_pdf,
    "region": region_pdf,
}


def tpch_db(*, sf: float = 0.01) -> dict[str, pd.DataFrame]:
    """All eight TPC-H-lite tables at ``sf`` as pandas frames."""
    return {name: gen(sf=sf) for name, gen in PDF_GENERATORS.items()}


def split_batches(pdf: pd.DataFrame, n_batches: int) -> list[pd.DataFrame]:
    """Split a table into ``n_batches`` row-group-like batches.

    Models Parquet row groups in replayable cloud storage: the batch list
    is deterministic, so input tasks can be replayed by index after a
    failure (the paper's replayable-input assumption).
    """
    n_batches = max(1, min(n_batches, len(pdf)))
    bounds = np.linspace(0, len(pdf), n_batches + 1).astype(int)
    return [
        pdf.iloc[bounds[i] : bounds[i + 1]].reset_index(drop=True)
        for i in range(n_batches)
    ]


# ---------------------------------------------------------------------------
# Spark wrappers
# ---------------------------------------------------------------------------

def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    return spark.createDataFrame(lineitem_pdf(sf=sf, seed=seed))


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    return spark.createDataFrame(orders_pdf(sf=sf, seed=seed))


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    return spark.createDataFrame(customer_pdf(sf=sf, seed=seed))


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    return spark.createDataFrame(part_pdf(sf=sf, seed=seed))


def supplier(spark: SparkSession, *, sf: float = 0.01, seed: int = 6) -> DataFrame:
    return spark.createDataFrame(supplier_pdf(sf=sf, seed=seed))


def partsupp(spark: SparkSession, *, sf: float = 0.01, seed: int = 7) -> DataFrame:
    return spark.createDataFrame(partsupp_pdf(sf=sf, seed=seed))


def nation(spark: SparkSession, **_: object) -> DataFrame:
    return spark.createDataFrame(nation_pdf())


def region(spark: SparkSession, **_: object) -> DataFrame:
    return spark.createDataFrame(region_pdf())


def register_tpch_views(
    spark: SparkSession, *, sf: float = 0.01
) -> dict[str, pd.DataFrame]:
    """Create temp views for all tables; return the pandas frames used.

    Returning the pandas frames lets callers hand the *same* data to the
    DuckDB oracle, so Spark and DuckDB provably read identical input.
    """
    db = tpch_db(sf=sf)
    for name, pdf in db.items():
        spark.createDataFrame(pdf).createOrReplaceTempView(name)
    return db


def zipf_keys(
    spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3
) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(
    spark: SparkSession, *, n: int, n_keys: int, seed: int = 4
) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )

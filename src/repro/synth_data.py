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
# PASS (SIGMOD'21) evaluation datasets — synthetic stand-ins for the three
# real datasets of §5.1.1 plus the §5.3 adversarial dataset. Each generator
# returns a pandas DataFrame (`*_pdf`) and a thin Spark wrapper, because the
# AQP harness needs a driver-side copy for ground truth while the synopsis
# build path consumes the Spark DataFrame. All are deterministic in `seed`.
# ---------------------------------------------------------------------------


def intel_wireless_pdf(*, n: int = 100_000, seed: int = 10) -> pd.DataFrame:
    """Stand-in for the Intel Berkeley wireless-sensor dataset.

    Predicate column ``time`` (int, sorted, near-unique); aggregate column
    ``light``. Light follows a diurnal regime — near-zero at night, a high
    plateau during the day — with heavy-tailed positive spikes, which gives
    the locally-low-variance / regime-change structure along the predicate
    axis that PASS's partitioner exploits on the real data.
    """
    g = _rng(seed)
    t = np.arange(n, dtype=np.int64) * 31  # ~31s sampling period
    day_phase = (t % 86_400) / 86_400.0
    is_day = ((day_phase > 0.3) & (day_phase < 0.75)).astype(np.float64)
    base = is_day * (350.0 + 80.0 * np.sin(2 * np.pi * day_phase))
    noise = g.normal(0.0, 8.0, n) * (0.2 + is_day)
    spikes = (g.random(n) < 0.01) * g.lognormal(5.0, 1.0, n)
    light = np.clip(base + noise + spikes, 0.0, None)
    return pd.DataFrame({"time": t, "light": light})


def instacart_pdf(*, n: int = 100_000, n_products: int = 5_000, seed: int = 11) -> pd.DataFrame:
    """Stand-in for the Instacart ``order_products`` table.

    Predicate column ``product_id`` (duplicate-heavy, Zipf-popular);
    aggregate column ``reordered`` in {0,1} whose probability varies by
    product, so AVG/SUM over product ranges is non-trivial.
    """
    g = _rng(seed)
    ranks = np.arange(1, n_products + 1)
    w = 1.0 / ranks**1.05
    w /= w.sum()
    pid = g.choice(ranks, size=n, p=w)
    # Per-product reorder probability: popular products are reordered more.
    p_re = 0.25 + 0.6 / (1.0 + (ranks / 50.0))
    reordered = (g.random(n) < p_re[pid - 1]).astype(np.int64)
    return pd.DataFrame({"product_id": pid.astype(np.int64), "reordered": reordered})


NYC_PREDICATES = ["pickup_time", "pickup_date", "pu_location_id", "dropoff_date", "dropoff_time"]


def nyc_taxi_pdf(*, n: int = 200_000, seed: int = 12) -> pd.DataFrame:
    """Stand-in for NYC TLC Jan-2019 yellow-taxi trips.

    The five §5.4 predicate columns (``NYC_PREDICATES``) and the aggregate
    ``trip_distance`` (lognormal, correlated with pickup time-of-day and
    location so multi-dimensional templates are non-independent — the
    regime where KD-PASS beats independence-based models).
    """
    g = _rng(seed)
    pickup_date = g.integers(1, 32, n)  # day of January
    # Time-of-day in seconds with rush-hour mixture.
    mode = g.random(n)
    tod = np.where(
        mode < 0.35,
        g.normal(8.6 * 3600, 1.2 * 3600, n),
        np.where(mode < 0.75, g.normal(18.0 * 3600, 1.6 * 3600, n), g.random(n) * 86_400),
    )
    pickup_time = np.clip(tod, 0, 86_399).astype(np.int64)
    loc = g.integers(1, 266, n)
    # Trip distance: longer off-peak and from outer locations.
    rush = np.exp(-((pickup_time - 8.6 * 3600) ** 2) / (2 * (1.5 * 3600) ** 2)) + np.exp(
        -((pickup_time - 18.0 * 3600) ** 2) / (2 * (1.8 * 3600) ** 2)
    )
    mu = 0.6 + 0.004 * loc - 0.35 * rush
    dist = np.clip(g.lognormal(mu, 0.55, n), 0.05, 80.0)
    dur = (dist * 300 + g.normal(0, 240, n)).clip(60, 3 * 3600).astype(np.int64)
    dropoff_abs = pickup_date * 86_400 + pickup_time + dur
    return pd.DataFrame(
        {
            "pickup_time": pickup_time,
            "pickup_date": pickup_date.astype(np.int64),
            "pu_location_id": loc.astype(np.int64),
            "dropoff_date": (dropoff_abs // 86_400).astype(np.int64),
            "dropoff_time": (dropoff_abs % 86_400).astype(np.int64),
            # Absolute pickup timestamp — the paper's 1-D pickup_datetime
            # predicate column (§5.1.1).
            "pickup_ts": pickup_date * 86_400 + pickup_time,
            "trip_distance": dist,
        }
    )


def adversarial_pdf(*, n: int = 100_000, seed: int = 13) -> pd.DataFrame:
    """The §5.3 adversarial dataset, scaled by ``n``.

    Predicate column ``c`` with n unique values; the first 87.5% of tuples
    (in predicate order) have aggregate 0, the last 12.5% are N(100, 10).
    Equal partitioning wastes all its partitions on the zero region; the
    ADP optimiser concentrates partitions on the normal tail.
    """
    g = _rng(seed)
    cut = int(n * 0.875)
    a = np.concatenate([np.zeros(cut), g.normal(100.0, 10.0, n - cut)])
    return pd.DataFrame({"c": np.arange(n, dtype=np.int64), "a": a})


def _to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    return spark.createDataFrame(pdf)


def intel_wireless(spark: SparkSession, **kw) -> DataFrame:
    return _to_spark(spark, intel_wireless_pdf(**kw))


def instacart(spark: SparkSession, **kw) -> DataFrame:
    return _to_spark(spark, instacart_pdf(**kw))


def nyc_taxi(spark: SparkSession, **kw) -> DataFrame:
    return _to_spark(spark, nyc_taxi_pdf(**kw))


def adversarial(spark: SparkSession, **kw) -> DataFrame:
    return _to_spark(spark, adversarial_pdf(**kw))

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
# Temporal-probabilistic workloads (ICDE'19 outer/anti join reproduction)
# ---------------------------------------------------------------------------
#
# The paper evaluates on two real datasets we cannot download (WebKit
# SVN history; Meteo Swiss measurements). The generators below build
# synthetic equivalents that preserve the properties the evaluation
# turns on — see DESIGN.md §4 for the substitution argument:
#
# - webkit_lite: many distinct facts (~0.32·n), θ = fact equality →
#   highly selective equi-join (PostgreSQL picked a merge join; Spark
#   plans a SortMergeJoin);
# - meteo_lite: 80 stations × 4 metrics = 320 fact series over a
#   shared time range, θ = same metric ∧ different station → weakly
#   selective join with dozens of valid matching tuples per output
#   interval (PostgreSQL fell back to a nested loop).
#
# Each relation is a chain of adjacent intervals per fact (as in both
# real datasets: "periods while unchanged" / merged measurement runs),
# which guarantees duplicate-freeness by construction. The second
# relation of each workload pair re-chains the same facts from shifted
# start points, mirroring the paper's shifted-interval copies.


def _chain_intervals(pdf: pd.DataFrame, starts: np.ndarray, key: str) -> pd.DataFrame:
    """Lay out each fact's tuples as an adjacent interval chain.

    ``starts`` holds one chain start per distinct ``key`` value;
    ``pdf['dur']`` the tuple durations. Returns ``pdf`` with int64
    ``ts``/``te`` columns added, duplicate-free per fact.
    """
    pdf = pdf.sort_values([key]).reset_index(drop=True)
    offset = pdf.groupby(key)["dur"].cumsum() - pdf["dur"]
    pdf["ts"] = (starts[pdf[key].to_numpy()] + offset).astype("int64")
    pdf["te"] = (pdf["ts"] + pdf["dur"]).astype("int64")
    return pdf.drop(columns=["dur"])


def webkit_lite_pdf(n: int, *, seed: int = 0, lid_prefix: str = "a",
                    shift: float = 0.0) -> pd.DataFrame:
    """WebKit-like TP relation: ~0.32·n facts, skewed durations.

    Schema: ``(file_path, lid, ts, te, p)``. ``shift`` displaces every
    chain start by ``shift``·(time range) on average — used to build
    the paper's "second relation" with the same facts and interval
    lengths but shifted positions.
    """
    g = _rng(seed)
    n_facts = max(1, int(n * 0.32))
    fact = g.integers(0, n_facts, n)
    dur = np.maximum(1, g.lognormal(3.0, 1.5, n)).astype("int64")
    time_range = max(10, 3 * n)
    starts = g.integers(0, time_range, n_facts)
    if shift:
        starts = starts + g.integers(0, max(1, int(shift * time_range)), n_facts)
    pdf = pd.DataFrame({"file_path": fact, "dur": dur})
    pdf = _chain_intervals(pdf, starts, "file_path")
    pdf["file_path"] = "f" + pdf["file_path"].astype(str)
    pdf["lid"] = [f"{lid_prefix}{i}" for i in range(len(pdf))]
    pdf["p"] = (0.5 + 0.5 * g.random(len(pdf))).round(6)
    return pdf[["file_path", "lid", "ts", "te", "p"]]


def meteo_lite_pdf(n: int, *, seed: int = 0, lid_prefix: str = "a",
                   n_stations: int = 80, n_metrics: int = 4,
                   shift: float = 0.0) -> pd.DataFrame:
    """Meteo-like TP relation: few fact series over a shared range.

    Schema: ``(station_id, value_id, lid, ts, te, p)``. The joint time
    range is ~0.3·n so that a tuple θ-matches (same metric, different
    station) a few dozen overlapping tuples — the low-selectivity
    regime that blows up the paper's Meteo runtimes.
    """
    g = _rng(seed)
    n_series = n_stations * n_metrics
    series = g.integers(0, n_series, n)
    dur = np.maximum(1, g.lognormal(2.5, 1.0, n)).astype("int64")
    chain_span = max(1.0, (n / n_series) * 20.0)
    time_range = max(10, int(5 * chain_span))
    starts = g.integers(0, time_range, n_series)
    if shift:
        starts = starts + g.integers(0, max(1, int(shift * time_range)), n_series)
    pdf = pd.DataFrame({"series": series, "dur": dur})
    pdf = _chain_intervals(pdf, starts, "series")
    pdf["station_id"] = (pdf["series"] // n_metrics).astype("int64")
    pdf["value_id"] = (pdf["series"] % n_metrics).astype("int64")
    pdf["lid"] = [f"{lid_prefix}{i}" for i in range(len(pdf))]
    pdf["p"] = (0.5 + 0.5 * g.random(len(pdf))).round(6)
    return pdf[["station_id", "value_id", "lid", "ts", "te", "p"]]


def random_tp_pdf(n: int, *, n_facts: int = 3, t_max: int = 30,
                  seed: int = 0, lid_prefix: str = "a") -> pd.DataFrame:
    """Small random TP relation for property tests (single fact column).

    Per-fact chains with random gaps, so intervals may be adjacent,
    disjoint, or absent — duplicate-free by construction.
    """
    g = _rng(seed)
    fact = g.integers(0, n_facts, n)
    dur = g.integers(1, max(2, t_max // 4), n)
    gap = g.integers(0, max(1, t_max // 4), n)
    # each tuple owns a slot of dur+gap in its fact's chain and is
    # valid over the first dur time points of it, leaving random holes
    pdf = pd.DataFrame({"k": fact, "dur": dur + gap, "valid": dur})
    starts = g.integers(0, t_max, n_facts)
    pdf = _chain_intervals(pdf, starts, "k")
    pdf["te"] = (pdf["ts"] + pdf["valid"]).astype("int64")
    pdf = pdf.drop(columns=["valid"])
    pdf["k"] = "k" + pdf["k"].astype(str)
    pdf["lid"] = [f"{lid_prefix}{i}" for i in range(len(pdf))]
    pdf["p"] = (0.05 + 0.9 * g.random(len(pdf))).round(4)
    return pdf[["k", "lid", "ts", "te", "p"]]


def tp_workload(spark: SparkSession, kind: str, n: int, *, seed: int = 0):
    """Build the (r, s, θ) triple of a paper workload at size ``n``.

    ``kind`` is ``"webkit"`` or ``"meteo"``. Both relations have ``n``
    tuples; ``s`` is the shifted re-chaining of the same facts.
    Returns ``(r, s, theta)`` with Spark DataFrames.
    """
    from repro.core.theta import Theta

    r_pdf, s_pdf, theta = tp_workload_pdf(kind, n, seed=seed)
    return spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf), theta


def tp_workload_pdf(kind: str, n: int, *, seed: int = 0):
    """Pandas variant of :func:`tp_workload` (for oracle/reference use)."""
    from repro.core.theta import Theta

    if kind == "webkit":
        r = webkit_lite_pdf(n, seed=seed, lid_prefix="a")
        s = webkit_lite_pdf(n, seed=seed + 1000, lid_prefix="b", shift=0.3)
        theta = Theta.equi("file_path")
    elif kind == "meteo":
        r = meteo_lite_pdf(n, seed=seed, lid_prefix="a")
        s = meteo_lite_pdf(n, seed=seed + 1000, lid_prefix="b", shift=0.3)
        theta = Theta.of(
            ("value_id", "=", "value_id"), ("station_id", "!=", "station_id")
        )
    else:
        raise ValueError(f"unknown workload kind {kind!r}")
    return r, s, theta

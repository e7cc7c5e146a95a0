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
# Temporal bipartite graphs (substrate for the TBFC reproduction)
# ---------------------------------------------------------------------------

_MS_PER_DAY = 86_400_000


def _zipf_choice(
    g: np.random.Generator, n_ids: int, size: int, alpha: float
) -> np.ndarray:
    """ids 0..n_ids-1 drawn with P(i) ∝ 1/(i+1)^alpha (power-law degrees)."""
    ranks = np.arange(1, n_ids + 1, dtype=np.float64)
    w = ranks**-alpha
    w /= w.sum()
    return g.choice(n_ids, size=size, p=w)


def temporal_bipartite_pdf(
    *,
    n_upper: int,
    n_lower: int,
    n_edges: int,
    span_days: float,
    alpha_u: float = 1.1,
    alpha_l: float = 1.1,
    follow_frac: float = 0.3,
    follow_u_frac: float = 0.5,
    gap_days: float = 5.0,
    copycat_frac: float = 0.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Synthetic temporal bipartite multigraph, time-sorted, distinct times.

    Two edge populations model what drives temporal butterflies in the
    paper's real datasets:

    * **base** edges: endpoints zipfian in each layer (degree skew),
      timestamps uniform over the span;
    * **follower** edges (fraction ``follow_frac``): copy one endpoint of
      a random base edge and re-draw the other, at a time lagging the
      source by Exp(``gap_days``) — temporal locality / co-action, the
      mechanism behind T0-style "follower" butterflies. A
      ``follow_u_frac`` share keeps the L endpoint (a new user repeats an
      action soon after), the rest keeps the U endpoint (the same user
      explores a new item). Within the keep-L followers, a
      ``copycat_frac`` share uses the *successor* of the source user
      instead of a fresh draw — persistent follower pairs, which is what
      produces the T0/T3-dominated profiles of datasets like Epinions.

    Columns: ``u``, ``v``, ``t`` (ms). Deterministic in ``seed``.
    """
    g = _rng(seed)
    span_ms = max(int(span_days * _MS_PER_DAY), 4 * n_edges)
    n_follow = int(n_edges * follow_frac)
    n_base = n_edges - n_follow
    u = _zipf_choice(g, n_upper, n_base, alpha_u)
    v = _zipf_choice(g, n_lower, n_base, alpha_l)
    t = g.integers(0, span_ms, size=n_base)
    if n_follow:
        src = g.integers(0, n_base, size=n_follow)
        gap = g.exponential(gap_days * _MS_PER_DAY, size=n_follow).astype(np.int64) + 1
        ft = np.minimum(t[src] + gap, span_ms - 1)
        keep_v = g.random(n_follow) < follow_u_frac
        copycat = keep_v & (g.random(n_follow) < copycat_frac)
        fresh_u = _zipf_choice(g, n_upper, n_follow, alpha_u)
        # copy direction ±1: successor-only would forbid reciprocal (T3-
        # style) butterflies; a successor-biased mix yields both strict
        # follower (T0) and mutual (T3) pairs, T0-leaning as in Epinions
        step = np.where(g.random(n_follow) < 2 / 3, 1, -1)
        fu = np.where(
            copycat, (u[src] + step) % n_upper, np.where(keep_v, fresh_u, u[src])
        )
        fv = np.where(keep_v, v[src], _zipf_choice(g, n_lower, n_follow, alpha_l))
        u = np.concatenate([u, fu])
        v = np.concatenate([v, fv])
        t = np.concatenate([t, ft])
    order = np.argsort(t, kind="stable")
    pdf = pd.DataFrame(
        {
            "u": u[order].astype(np.int64),
            "v": v[order].astype(np.int64),
            "t": t[order],
        }
    )
    # Tie-break to pairwise-distinct timestamps (the paper's assumption):
    # bump each sorted draw to the next free integer — sub-ms nudges on a
    # multi-day span, so the distribution is effectively unchanged.
    ts = pdf["t"].to_numpy()
    idx = np.arange(len(ts), dtype=np.int64)
    pdf["t"] = np.maximum.accumulate(ts - idx) + idx
    return pdf.astype("int64")


def temporal_bipartite(spark: SparkSession, **kwargs) -> DataFrame:
    """Spark wrapper over :func:`temporal_bipartite_pdf`."""
    return spark.createDataFrame(temporal_bipartite_pdf(**kwargs))


def extreme_hub_pdf(
    *, n_middles: int, span_days: float = 10.0, seed: int = 0
) -> pd.DataFrame:
    """The paper's Figure-8 extreme case: two high-degree vertices.

    Two upper hubs ``u0, u1`` each connect once to every one of
    ``n_middles`` lower vertices, at pairwise-distinct times spread over
    the span. Every wedge lands in one (start, end) group with a
    distinct ``t_s``; with δ covering the span the TBC⁺ hashmap keeps
    all of them, so its Query degenerates to the quadratic α ≈ |W(u)|
    regime that §4.4's tree structures (TBC⁺⁺) are built to fix.
    """
    g = _rng(seed)
    n = 2 * n_middles
    t = g.permutation(n).astype(np.int64) * max(
        1, int(span_days * _MS_PER_DAY) // n
    )
    return pd.DataFrame(
        {
            "u": np.repeat(np.arange(2, dtype=np.int64), n_middles),
            "v": np.tile(np.arange(n_middles, dtype=np.int64), 2),
            "t": t,
        }
    ).astype("int64")

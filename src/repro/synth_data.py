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
# Time-series generators for the Dangoron reproduction
# ---------------------------------------------------------------------------
#
# The paper evaluates on the NOAA NCEI USCRN hourly-2020 station data
# ("NCEA Data Set"). The container has no network access, so
# ``uscrn_like`` synthesizes a station×variable panel with the properties
# the paper's techniques exploit and are judged on (DESIGN.md §3):
# slowly drifting cross-correlations, a realistic mix of strongly
# correlated (same variable, nearby stations) and weakly correlated
# (cross-variable) pairs, and hourly resolution with natural daily basic
# windows.

_USCRN_VARS = ("temperature", "solar", "wind", "precip")


def _ar1(g: np.random.Generator, n: int, length: int, phi: float, sigma: float) -> np.ndarray:
    """n independent AR(1) processes of the given length."""
    eps = g.normal(0.0, sigma, size=(n, length))
    out = np.empty((n, length))
    out[:, 0] = eps[:, 0] / max(np.sqrt(1 - phi * phi), 1e-9)
    for t in range(1, length):
        out[:, t] = phi * out[:, t - 1] + eps[:, t]
    return out


def ar1_matrix(
    *, n: int, length: int, phi: float = 0.9, sigma: float = 1.0, seed: int = 0
) -> np.ndarray:
    """Independent AR(1) series — a neutral dataset for unit tests."""
    return _ar1(_rng(seed), n, length, phi, sigma)


def uscrn_like(
    *,
    n_stations: int = 32,
    n_hours: int = 8760,
    n_regions: int = 4,
    seed: int = 0,
    variables: tuple[str, ...] = _USCRN_VARS,
) -> np.ndarray:
    """Climate-like hourly panel: ``n_stations × len(variables)`` series.

    Returns a dense matrix of shape (n_stations * len(variables), n_hours);
    series are ordered variable-major (all temperature series first), so
    same-variable pairs — the highly correlated ones — share a band.

    Construction: stations live on a grid and load onto ``n_regions``
    regional AR(1) weather fields with distance-decaying weights, which
    yields spatially correlated, slowly *drifting* correlations (regional
    weather comes and goes — precisely the temporal stability + slow
    drift Dangoron's jumping exploits). Variables:

    - temperature: annual + diurnal harmonics + regional AR(1) noise;
    - solar: clipped diurnal cycle modulated by regional cloudiness;
    - wind: rough AR(1) with weak regional coupling;
    - precip: bursty gamma rain driven by regional occurrence processes
      (mostly uncorrelated with temperature — these cross-variable pairs
      are what a threshold β prunes away).
    """
    g = _rng(seed)
    t = np.arange(n_hours)
    annual = np.sin(2 * np.pi * t / 8760.0)
    diurnal = np.sin(2 * np.pi * t / 24.0)

    side = int(np.ceil(np.sqrt(n_stations)))
    coords = np.array([(i % side, i // side) for i in range(n_stations)], dtype=float)
    centers = g.uniform(0, side, size=(n_regions, 2))
    d = np.linalg.norm(coords[:, None, :] - centers[None, :, :], axis=2)
    wgt = np.exp(-d / (side / 2.0))
    wgt /= wgt.sum(axis=1, keepdims=True)  # (n_stations, n_regions)

    regional_T = _ar1(g, n_regions, n_hours, phi=0.98, sigma=0.4)
    regional_cloud = _ar1(g, n_regions, n_hours, phi=0.95, sigma=0.5)
    regional_rain = _ar1(g, n_regions, n_hours, phi=0.90, sigma=1.0)
    regional_wind = _ar1(g, n_regions, n_hours, phi=0.85, sigma=0.8)

    lat = coords[:, 1:2] / max(side - 1, 1)  # 0..1 north-south factor
    out = []
    for var in variables:
        if var == "temperature":
            base = (
                10.0 * (1.0 + 0.3 * lat) * annual[None, :]
                + 4.0 * diurnal[None, :]
                + 15.0 * (1.0 - 0.5 * lat)
            )
            x = base + 3.0 * (wgt @ regional_T) + _ar1(g, n_stations, n_hours, 0.8, 0.8)
        elif var == "solar":
            clouds = 1.0 / (1.0 + np.exp(-(wgt @ regional_cloud)))
            x = np.clip(diurnal[None, :], 0, None) * (
                0.6 + 0.4 * np.clip(annual[None, :], 0, None)
            ) * (1.2 - clouds) * 800.0 + _ar1(g, n_stations, n_hours, 0.3, 10.0)
        elif var == "wind":
            x = 5.0 + 1.5 * (wgt @ regional_wind) + _ar1(g, n_stations, n_hours, 0.7, 1.2)
        elif var == "precip":
            occ = (wgt @ regional_rain) > 1.0
            amount = g.gamma(0.8, 2.0, size=(n_stations, n_hours))
            x = occ * amount + 0.01 * g.random((n_stations, n_hours))
        else:
            raise ValueError(f"unknown USCRN-like variable {var!r}")
        out.append(x)
    return np.concatenate(out, axis=0)


def uscrn_like_df(
    spark: SparkSession,
    *,
    n_stations: int = 32,
    n_hours: int = 8760,
    seed: int = 0,
) -> DataFrame:
    """Long-form Spark DataFrame view of ``uscrn_like``."""
    from repro.tsio.matrix import to_long_df

    return to_long_df(spark, uscrn_like(n_stations=n_stations, n_hours=n_hours, seed=seed))

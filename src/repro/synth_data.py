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
# Time series generators for the HTPGM reproduction (paper §VI-A1).
#
# The paper evaluates on three smart-energy datasets (NIST, UKDALE,
# DataPort: binary On/Off appliances) and one smart-city dataset (NYC
# weather + collisions: multi-state variables).  Those downloads are not
# available offline, so we generate structurally equivalent series (see
# DESIGN.md §4): appliance *groups* share latent daily activity windows
# (high NMI within a group, frequent Contain/Follow/Overlap patterns),
# plus independent noise appliances (low NMI, infrequent patterns) that
# give A-HTPGM's correlation pruning something to prune.  The smart-city
# generator drives weather variables from a latent daily "severity"
# process and lags the collision variables behind it.
#
# Scale is configurable; the *-lite defaults keep the mining tractable
# on one machine while preserving the comparative shapes of Tables
# IV-IX.  A "day" is one sequence of `slots_per_seq` 5-minute slots.
# ---------------------------------------------------------------------------

from dataclasses import dataclass, field


@dataclass(frozen=True)
class EnergySpec:
    """Shape of a synthetic smart-energy dataset."""

    name: str
    n_seq: int = 96  # days
    slots_per_seq: int = 96  # 5-min slots (8 hours of interest)
    #: appliance groups sharing a latent activity window; each entry is
    #: a list of appliance names
    groups: tuple = (
        ("kitchen", "toaster", "microwave", "coffee"),
        ("washer", "dryer"),
    )
    #: appliances toggling independently of any group
    noise_vars: tuple = ("tv", "lamp")
    p_active: float = 0.9  # P(group member joins the activity window)
    seed: int = 0


@dataclass(frozen=True)
class CitySpec:
    """Shape of a synthetic smart-city dataset."""

    name: str
    n_seq: int = 96
    slots_per_seq: int = 48
    weather_vars: tuple = ("rain", "wind", "visibility", "cloud")
    collision_vars: tuple = ("motorist_injury", "cyclist_injury")
    noise_vars: tuple = ("pedestrian_count", "temperature")
    n_states: int = 4
    seed: int = 0


#: Lite counterparts of the paper's four datasets (Table IV).  Variable
#: counts are scaled down ~6x; the mining-relevant structure (group
#: correlation, alphabet sizes) is preserved.
ENERGY_SPECS = {
    "nist": EnergySpec(
        name="nist",
        groups=(
            ("kitchen", "toaster", "microwave", "coffee"),
            ("washer", "dryer", "iron"),
            ("bath_light", "bath_plug"),
        ),
        noise_vars=("tv", "lamp", "fridge"),
        seed=11,
    ),
    "ukdale": EnergySpec(
        name="ukdale",
        groups=(
            ("kitchen", "kettle", "toaster"),
            ("washer", "dryer"),
        ),
        noise_vars=("tv", "lamp", "boiler"),
        seed=22,
    ),
    "dataport": EnergySpec(
        name="dataport",
        groups=(
            ("kitchen", "microwave", "cooktop"),
            ("washer", "dryer"),
        ),
        noise_vars=("ev_charger",),
        seed=33,
    ),
}

CITY_SPECS = {
    "smartcity": CitySpec(name="smartcity", seed=44),
}


def _energy_values(spec: EnergySpec) -> pd.DataFrame:
    """Numeric readings (var, t, value) for an energy spec.

    On slots draw power ~ N(1.0, 0.2) (>= 0.05 threshold), Off slots
    ~ |N(0, 0.01)| (< 0.05), so the §VI-A2 thresholding recovers the
    intended symbols exactly up to measurement noise.
    """
    g = _rng(spec.seed)
    n_days, slots = spec.n_seq, spec.slots_per_seq
    frames = []

    def runs_to_series(on: np.ndarray) -> np.ndarray:
        vals = np.abs(g.normal(0.0, 0.01, on.shape))
        vals[on] = np.clip(g.normal(1.0, 0.2, on.sum()), 0.1, None)
        return vals

    all_vars = [v for grp in spec.groups for v in grp] + list(spec.noise_vars)
    on_masks = {v: np.zeros((n_days, slots), dtype=bool) for v in all_vars}

    for day in range(n_days):
        for gi, grp in enumerate(spec.groups):
            # The group is active on ~3/4 of the days; on active days it
            # has two latent activity windows (e.g. morning + evening).
            if g.random() > 0.75:
                continue
            anchors = [
                int(g.integers(5, slots // 2 - 10)),
                int(g.integers(slots // 2, slots - 20)),
            ]
            for anchor in anchors:
                span = int(g.integers(10, 18))
                for vi, var in enumerate(grp):
                    # Later group members are used progressively less
                    # often (real appliance usage is heterogeneous);
                    # this spreads event supports across [~0.2, ~0.9]
                    # so sigma/delta pruning has something to prune.
                    if g.random() > spec.p_active * 0.78**vi:
                        continue
                    # member vi starts a bit later and runs shorter, so
                    # Contain (first member over later ones), Follow and
                    # Overlap relations all arise within the group
                    start = anchor + vi * 2 + int(g.integers(0, 2))
                    dur = max(2, span - vi * 3 + int(g.integers(-1, 2)))
                    end = min(slots, start + dur)
                    if start < slots:
                        on_masks[var][day, start:end] = True
        for var in spec.noise_vars:
            # Independent random toggles on ~40% of days.
            if g.random() > 0.4:
                continue
            for _ in range(int(g.integers(1, 3))):
                start = int(g.integers(0, slots - 2))
                end = start + int(g.integers(1, 5))
                on_masks[var][day, start:end] = True

    for var in all_vars:
        vals = runs_to_series(on_masks[var].ravel())
        frames.append(
            pd.DataFrame(
                {
                    "var": var,
                    "t": np.arange(n_days * slots),
                    "value": vals,
                }
            )
        )
    return pd.concat(frames, ignore_index=True)


def _city_values(spec: CitySpec) -> pd.DataFrame:
    """Numeric readings (var, t, value) for a smart-city spec.

    A latent per-day severity process (smoothed random walk with
    occasional storm spikes) drives the weather variables; collision
    variables follow it with a lag, noise variables are independent.
    """
    g = _rng(spec.seed)
    n_days, slots = spec.n_seq, spec.slots_per_seq
    frames = []
    series = {
        v: np.zeros(n_days * slots)
        for v in (
            list(spec.weather_vars)
            + list(spec.collision_vars)
            + list(spec.noise_vars)
        )
    }

    def smooth(x: np.ndarray, width: int = 13) -> np.ndarray:
        # Weather states persist for tens of minutes; a moving average
        # keeps the symbolized series from flipping every slot.
        kernel = np.ones(width) / width
        return np.convolve(x, kernel, mode="same")

    for day in range(n_days):
        base = smooth(np.cumsum(g.normal(0, 0.2, slots)))
        base -= base.min()
        if g.random() < 0.5:  # storm day: a pronounced severity bump
            c = int(g.integers(10, slots - 30))
            w = int(g.integers(12, 25))
            base[c : c + w] += g.uniform(2.0, 4.0)
            base = smooth(base)
        sl = slice(day * slots, (day + 1) * slots)
        for i, var in enumerate(spec.weather_vars):
            series[var][sl] = base * g.uniform(0.8, 1.2) + smooth(
                g.normal(0, 0.25, slots)
            )
        for i, var in enumerate(spec.collision_vars):
            lag = 3 + 2 * i
            lagged = np.roll(base, lag)
            lagged[:lag] = base[0]
            series[var][sl] = lagged * g.uniform(0.7, 1.1) + smooth(
                g.normal(0, 0.3, slots)
            )
        for var in spec.noise_vars:
            # Day-level regimes: flat near zero half the days, a noisy
            # walk otherwise.  Keeps these series uncorrelated with the
            # severity process while preventing their states from being
            # near-universally supported (which would let uncorrelated
            # pairs dominate the high-support pattern set).
            if g.random() < 0.5:
                series[var][sl] = np.abs(g.normal(0, 0.02, slots))
            else:
                series[var][sl] = smooth(g.normal(0, 1.0, slots))
    for var, vals in series.items():
        frames.append(
            pd.DataFrame(
                {"var": var, "t": np.arange(n_days * slots), "value": vals}
            )
        )
    return pd.concat(frames, ignore_index=True)


def readings_pandas(name: str, *, n_seq: int | None = None) -> pd.DataFrame:
    """Readings (var, t, value) for a named dataset, as pandas.

    ``n_seq`` overrides the spec's number of day-sequences (used by the
    scalability experiments, which vary the data size).
    """
    if name in ENERGY_SPECS:
        spec = ENERGY_SPECS[name]
        if n_seq is not None:
            spec = EnergySpec(**{**spec.__dict__, "n_seq": n_seq})
        return _energy_values(spec)
    if name in CITY_SPECS:
        spec = CITY_SPECS[name]
        if n_seq is not None:
            spec = CitySpec(**{**spec.__dict__, "n_seq": n_seq})
        return _city_values(spec)
    raise KeyError(f"unknown dataset {name!r}")


def readings(spark: SparkSession, name: str, *, n_seq: int | None = None) -> DataFrame:
    """Spark readings DataFrame for a named dataset."""
    return spark.createDataFrame(readings_pandas(name, n_seq=n_seq))


def dataset_names() -> list[str]:
    return list(ENERGY_SPECS) + list(CITY_SPECS)


def slots_per_seq(name: str) -> int:
    spec = ENERGY_SPECS.get(name) or CITY_SPECS.get(name)
    if spec is None:
        raise KeyError(f"unknown dataset {name!r}")
    return spec.slots_per_seq


def is_energy(name: str) -> bool:
    return name in ENERGY_SPECS


def city_state_labels(n_states: int = 4) -> list[str]:
    """State labels for percentile binning of smart-city variables."""
    return ["none", "low", "medium", "high", "extreme"][:n_states]

"""Synthetic equivalents of the paper's 11 real-world datasets (Table 4).

The container has no network access, so each Kaggle/UCI dataset is
replaced by a generator with the same column count and the same type mix
the paper describes: autocorrelated AR(1) sensor floats (IoT meters),
zipf-skewed categoricals, unix timestamps, heavy-tailed trip metrics and
asynchronous-sampling nulls (Aqua/Build) or event nulls (Flights/Taxis).
Row counts default to paper rows / 50 (DESIGN.md substitution table).

Timestamps are generated as epoch-second int64 columns — identical
information content, and it keeps Spark/DuckDB/pandas timezone semantics
out of the correctness loop.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np
import pandas as pd

_T0 = 1_577_836_800  # 2020-01-01 UTC


def _ar1(rng, n, mu, sigma, phi=0.98, decimals=2):
    """AR(1) sensor series — smooth, as electrical/environment meters are."""
    eps = rng.normal(0.0, sigma * np.sqrt(1 - phi**2), n)
    x = np.empty(n)
    x[0] = mu + rng.normal(0, sigma)
    for t in range(1, n):
        x[t] = mu + phi * (x[t - 1] - mu) + eps[t]
    return np.round(x, decimals)


def _zipf_cat(rng, n, labels, alpha=1.2):
    ranks = np.arange(1, len(labels) + 1, dtype=float)
    p = ranks**-alpha
    p /= p.sum()
    return rng.choice(labels, size=n, p=p)


def _null_out(rng, s: pd.Series, frac: float) -> pd.Series:
    mask = rng.random(len(s)) < frac
    out = s.astype("float64").copy()
    out[mask] = np.nan
    return out


def _ts(n, step=60):
    return (_T0 + np.arange(n, dtype=np.int64) * step).astype(np.int64)


def gen_aqua(n: int, seed: int = 0) -> pd.DataFrame:
    """Aquaponics ponds: shared timestamp + 4 ponds x 3 sensors, nulls from
    asynchronous sampling (13 columns)."""
    rng = np.random.default_rng(seed)
    df = {"ts": _ts(n)}
    for p in range(4):
        r = np.random.default_rng(seed + 10 + p)
        df[f"pond{p}_ph"] = _null_out(rng, pd.Series(_ar1(r, n, 7.0, 0.4)), 0.35)
        df[f"pond{p}_temp"] = _null_out(rng, pd.Series(_ar1(r, n, 26.0, 2.0)), 0.35)
        df[f"pond{p}_do"] = _null_out(rng, pd.Series(_ar1(r, n, 6.5, 1.0)), 0.35)
    return pd.DataFrame(df)


def _gen_meter(n: int, seed: int, n_chan: int, base: float) -> pd.DataFrame:
    """Sub-metered channels: appliances are off (exact 0.00) most of the
    time — the idle redundancy real meter data has and GD deduplicates."""
    rng = np.random.default_rng(seed)
    df = {"ts": _ts(n)}
    for c in range(n_chan):
        r = np.random.default_rng(seed + 100 + c)
        duty = (r.random(n) < 0.3).astype(float)  # appliance on/off regime
        df[f"ch{c}"] = np.round(
            np.abs(_ar1(r, n, base * (0.5 + c / n_chan), base / 4)), 2
        ) * duty
    return pd.DataFrame(df)


def gen_basement(n: int, seed: int = 1) -> pd.DataFrame:
    """Basement sub-meter power, 12 columns."""
    return _gen_meter(n, seed, 11, 120.0)


def gen_furnace(n: int, seed: int = 2) -> pd.DataFrame:
    """Furnace power, 12 columns."""
    return _gen_meter(n, seed, 11, 450.0)


def gen_current(n: int, seed: int = 3) -> pd.DataFrame:
    """Electric meter currents, 24 columns."""
    return _gen_meter(n, seed, 23, 8.0)


def gen_build(n: int, seed: int = 4) -> pd.DataFrame:
    """Smart-building rooms: ts, room id + sensors, async nulls (7 cols)."""
    rng = np.random.default_rng(seed)
    rooms = [f"R{i:03d}" for i in range(50)]
    df = pd.DataFrame(
        {
            "ts": _ts(n, step=30),
            "room": _zipf_cat(rng, n, rooms, alpha=0.8),
            "co2": _null_out(rng, pd.Series(_ar1(rng, n, 600, 150, decimals=1)), 0.25),
            "humidity": _null_out(rng, pd.Series(_ar1(rng, n, 45, 8, decimals=1)), 0.25),
            "temperature": _null_out(rng, pd.Series(_ar1(rng, n, 22, 2.5, decimals=1)), 0.25),
            "light": _null_out(rng, pd.Series(np.round(np.abs(_ar1(rng, n, 300, 200)), 1)), 0.25),
            "pir": (rng.random(n) < 0.12).astype(np.int64),
        }
    )
    return df


def gen_gas(n: int, seed: int = 5) -> pd.DataFrame:
    """Home gas sensors: temp + humidity + 8 MOX resistances + flags (12)."""
    rng = np.random.default_rng(seed)
    df = {"ts": _ts(n, step=1), "temp": _ar1(rng, n, 26, 2, decimals=1),
          "humidity": _ar1(rng, n, 55, 8, decimals=1)}
    for c in range(8):
        r = np.random.default_rng(seed + 30 + c)
        df[f"r{c+1}"] = np.round(np.exp(_ar1(r, n, 9.0 + c / 10, 0.4, decimals=4)), 2)
    df["event"] = (rng.random(n) < 0.05).astype(np.int64)
    return pd.DataFrame(df)


def gen_light(n: int, seed: int = 6) -> pd.DataFrame:
    """IoT light detection, 9 columns."""
    rng = np.random.default_rng(seed)
    lux = np.round(np.abs(_ar1(rng, n, 400, 350)), 1)
    return pd.DataFrame(
        {
            "ts": _ts(n, step=10),
            "device": _zipf_cat(rng, n, [f"dev{i}" for i in range(8)]),
            "lux": lux,
            "uv": np.round(lux / 400 + rng.normal(0, 0.1, n), 3).clip(0),
            "ir": np.round(lux * 1.8 + rng.normal(0, 50, n), 1).clip(0),
            "battery": np.round(np.linspace(100, 20, n) + rng.normal(0, 1, n), 1),
            "rssi": rng.integers(-95, -35, n),
            "daylight": (lux > 350).astype(np.int64),
            "motion": (rng.random(n) < 0.07).astype(np.int64),
        }
    )


def gen_power(n: int, seed: int = 7) -> pd.DataFrame:
    """Household power (UCI-style), 10 columns."""
    rng = np.random.default_rng(seed)
    active = np.round(np.abs(_ar1(rng, n, 1.1, 0.9)), 3)
    # sub-meters are exactly 0.0 most of the time, as in the UCI data
    sub1 = np.round(np.abs(_ar1(rng, n, 1.2, 1.5)), 1).clip(0, 80) * (rng.random(n) < 0.25)
    sub2 = np.round(np.abs(_ar1(rng, n, 1.4, 1.8)), 1).clip(0, 80) * (rng.random(n) < 0.35)
    sub3 = np.round(np.abs(_ar1(rng, n, 6.5, 7.0)), 1).clip(0, 31) * (rng.random(n) < 0.6)
    return pd.DataFrame(
        {
            "ts": _ts(n),
            "global_active_power": active,
            "global_reactive_power": np.round(np.abs(_ar1(rng, n, 0.12, 0.1)), 3),
            "voltage": _ar1(rng, n, 240.0, 3.5),
            "global_intensity": np.round(active * 4.2 + rng.normal(0, 0.3, n), 1).clip(0),
            "sub_metering_1": sub1,
            "sub_metering_2": sub2,
            "sub_metering_3": sub3,
            "other_load": np.round((active * 1000 / 60 - sub1 - sub2 - sub3).clip(0), 2),
            "tariff": _zipf_cat(rng, n, ["peak", "offpeak", "shoulder"], alpha=0.5),
        }
    )


def gen_temp(n: int, seed: int = 8) -> pd.DataFrame:
    """GCP temperature IoT, 5 columns."""
    rng = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "ts": _ts(n, step=5),
            "device": _zipf_cat(rng, n, [f"sensor-{i:02d}" for i in range(12)]),
            "temperature": _ar1(rng, n, 21.5, 3.0, decimals=1),
            "humidity": _ar1(rng, n, 48.0, 9.0, decimals=1),
            "battery": np.round(rng.uniform(3.0, 4.2, n), 2),
        }
    )


_AIRLINES = ["AA", "DL", "UA", "WN", "B6", "AS", "NK", "F9", "HA", "VX", "OO", "EV", "MQ", "US"]
_AIRPORTS = [f"AP{i:02d}" for i in range(60)]
_CANCEL = ["A", "B", "C", "D"]


def gen_flights(n: int, seed: int = 9) -> pd.DataFrame:
    """Flight delays & cancellations — all 32 columns like the paper
    (date parts, carriers, times, delays, cancellation fields with nulls)."""
    rng = np.random.default_rng(seed)
    month = rng.integers(1, 13, n)
    day = rng.integers(1, 29, n)
    dow = rng.integers(1, 8, n)
    dist = np.round(np.abs(rng.lognormal(6.4, 0.6, n))).clip(50, 5000)
    sched_dep = rng.integers(0, 2400, n)
    dep_delay = np.round(rng.gamma(1.2, 18, n) - 8).clip(-20, 900)
    air_time = np.round(dist / 7.5 + rng.normal(0, 10, n)).clip(20, 700)
    taxi_out = np.round(rng.gamma(4, 4, n)).clip(1, 120)
    taxi_in = np.round(rng.gamma(2.5, 3, n)).clip(1, 60)
    elapsed = air_time + taxi_out + taxi_in
    arr_delay = np.round(dep_delay + rng.normal(0, 12, n)).clip(-60, 950)
    cancelled = (rng.random(n) < 0.015).astype(np.int64)
    diverted = (rng.random(n) < 0.003).astype(np.int64)
    big_delay = arr_delay > 45
    def delay_part(p):
        v = np.where(big_delay & (rng.random(n) < p), np.round(arr_delay * rng.random(n)), 0.0)
        return _null_out(rng, pd.Series(v), 0.6)
    pdf = pd.DataFrame(
        {
            "year": np.full(n, 2015, dtype=np.int64),
            "month": month,
            "day": day,
            "day_of_week": dow,
            "airline": _zipf_cat(rng, n, _AIRLINES, alpha=0.9),
            "flight_number": rng.integers(1, 7000, n),
            "tail_number": _zipf_cat(rng, n, [f"N{i:04d}" for i in range(400)], alpha=0.3),
            "origin_airport": _zipf_cat(rng, n, _AIRPORTS, alpha=1.0),
            "destination_airport": _zipf_cat(rng, n, _AIRPORTS, alpha=1.0),
            "scheduled_departure": sched_dep,
            "departure_time": _null_out(rng, pd.Series((sched_dep + dep_delay) % 2400), 0.015),
            "departure_delay": _null_out(rng, pd.Series(dep_delay), 0.015),
            "taxi_out": _null_out(rng, pd.Series(taxi_out), 0.015),
            "wheels_off": _null_out(rng, pd.Series((sched_dep + dep_delay + taxi_out) % 2400), 0.015),
            "scheduled_time": np.round(dist / 7.5 + 30),
            "elapsed_time": _null_out(rng, pd.Series(elapsed), 0.02),
            "air_time": _null_out(rng, pd.Series(air_time), 0.02),
            "distance": dist,
            "wheels_on": _null_out(rng, pd.Series((sched_dep + elapsed - taxi_in) % 2400), 0.02),
            "taxi_in": _null_out(rng, pd.Series(taxi_in), 0.02),
            "scheduled_arrival": (sched_dep + np.round(dist / 7.5 + 30)) % 2400,
            "arrival_time": _null_out(rng, pd.Series((sched_dep + elapsed) % 2400), 0.02),
            "arrival_delay": _null_out(rng, pd.Series(arr_delay), 0.02),
            "diverted": diverted,
            "cancelled": cancelled,
            "cancellation_reason": pd.Series(
                np.where(cancelled == 1, _zipf_cat(rng, n, _CANCEL, 0.7), None)
            ),
            "air_system_delay": delay_part(0.5),
            "security_delay": delay_part(0.05),
            "airline_delay": delay_part(0.5),
            "late_aircraft_delay": delay_part(0.4),
            "weather_delay": delay_part(0.2),
            "carrier_code": _zipf_cat(rng, n, [a + "X" for a in _AIRLINES], alpha=0.9),
        }
    )
    assert pdf.shape[1] == 32
    return pdf


def gen_taxis(n: int, seed: int = 10) -> pd.DataFrame:
    """Chicago taxi trips 2020, 23 columns with heavy tails and nulls."""
    rng = np.random.default_rng(seed)
    miles = np.round(rng.lognormal(0.9, 1.0, n), 2).clip(0, 60)
    seconds = np.round(miles * 140 + rng.gamma(2, 120, n)).clip(30, 20000)
    fare = np.round(3.25 + miles * 2.25 + seconds * 0.005 + rng.normal(0, 1.5, n), 2).clip(3.25, 500)
    tips = np.round(np.where(rng.random(n) < 0.45, fare * rng.uniform(0.1, 0.3, n), 0), 2)
    tolls = np.round(np.where(rng.random(n) < 0.02, rng.uniform(1, 10, n), 0), 2)
    extras = np.round(np.where(rng.random(n) < 0.3, rng.choice([0.5, 1.0, 2.0, 4.0], n), 0), 2)
    start = _T0 + rng.integers(0, 365 * 24 * 3600, n)
    area = lambda: _null_out(rng, pd.Series(rng.integers(1, 78, n)), 0.12)
    pdf = pd.DataFrame(
        {
            "trip_id": np.arange(n, dtype=np.int64),
            "taxi_id": _zipf_cat(rng, n, [f"T{i:04d}" for i in range(500)], alpha=0.5),
            "trip_start": start.astype(np.int64),
            "trip_end": (start + seconds).astype(np.int64),
            "trip_seconds": seconds,
            "trip_miles": miles,
            "pickup_area": area(),
            "dropoff_area": area(),
            "fare": fare,
            "tips": tips,
            "tolls": tolls,
            "extras": extras,
            "trip_total": np.round(fare + tips + tolls + extras, 2),
            "payment_type": _zipf_cat(rng, n, ["Credit Card", "Cash", "Mobile", "Prcard", "Unknown"], 1.0),
            "company": _zipf_cat(rng, n, [f"Co {i}" for i in range(30)], 1.1),
            "pickup_lat": _null_out(rng, pd.Series(np.round(41.88 + rng.normal(0, 0.06, n), 6)), 0.15),
            "pickup_lon": _null_out(rng, pd.Series(np.round(-87.63 + rng.normal(0, 0.06, n), 6)), 0.15),
            "dropoff_lat": _null_out(rng, pd.Series(np.round(41.88 + rng.normal(0, 0.07, n), 6)), 0.15),
            "dropoff_lon": _null_out(rng, pd.Series(np.round(-87.63 + rng.normal(0, 0.07, n), 6)), 0.15),
            "shared": (rng.random(n) < 0.08).astype(np.int64),
            "pooled_fee": np.round(np.where(rng.random(n) < 0.08, rng.uniform(0.5, 3, n), 0), 2),
            "hour": ((start // 3600) % 24).astype(np.int64),
            "dow": ((start // 86400) % 7).astype(np.int64),
        }
    )
    assert pdf.shape[1] == 23
    return pdf


@dataclass
class DatasetSpec:
    name: str
    description: str
    paper_rows: int
    paper_cols: int
    paper_mb: float
    gen: Callable[[int, int], pd.DataFrame]
    has_nulls: bool = False

    def default_rows(self, scale: float = 1 / 50) -> int:
        return max(2000, int(self.paper_rows * scale))

    def generate(self, n: int | None = None, seed: int | None = None) -> pd.DataFrame:
        n = n if n is not None else self.default_rows()
        pdf = self.gen(n) if seed is None else self.gen(n, seed)
        assert pdf.shape == (n, self.paper_cols), (
            f"{self.name}: got {pdf.shape}, want ({n},{self.paper_cols})"
        )
        return pdf


DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("aqua", "Aquaponics sensors", 913_465, 13, 66.7, gen_aqua, True),
        DatasetSpec("basement", "Basement power", 1_051_200, 12, 50.5, gen_basement),
        DatasetSpec("build", "Smart building systems", 14_381_639, 7, 402.7, gen_build, True),
        DatasetSpec("current", "Electric meters current", 1_051_200, 24, 100.9, gen_current),
        DatasetSpec("flights", "Flight delays & cancellations", 5_819_079, 32, 756.5, gen_flights, True),
        DatasetSpec("furnace", "Furnace power", 1_051_200, 12, 50.5, gen_furnace),
        DatasetSpec("gas", "Home gas sensor", 928_991, 12, 44.6, gen_gas),
        DatasetSpec("light", "IoT light detection", 405_184, 9, 19.9, gen_light),
        DatasetSpec("power", "Home power consumption", 2_049_280, 10, 82.0, gen_power),
        DatasetSpec("taxis", "Chicago taxi trips 2020", 3_889_032, 23, 1753.9, gen_taxis, True),
        DatasetSpec("temp", "Temperature sensor", 10_553_597, 5, 369.4, gen_temp),
    ]
}


def dataset_columns(pdf: pd.DataFrame) -> tuple[list[str], list[str], list[str]]:
    """(numeric aggregation columns, predicate columns, categorical cols)
    for workload generation. Timestamp-ish and id-ish columns stay
    predicate-only."""
    cats = [c for c in pdf.columns if pdf[c].dtype == object]
    numeric = [
        c
        for c in pdf.columns
        if c not in cats and not c.startswith(("ts", "trip_start", "trip_end", "trip_id"))
    ]
    return numeric, list(pdf.columns), cats

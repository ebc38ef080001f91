"""Synthetic stand-ins for the paper's evaluation datasets (Table 4).

The paper evaluates on seven real datasets plus the synthetic Tax generator
(SP Stock, Hospital, Food Inspection, Airport, Adult, Flight, NC Voter).
None are shippable offline, so each is replaced by a generator with the
*same relation width* and a set of planted **golden DCs** matching the
documented semantics of the real dataset (e.g. Stock's OHLC ordering, the
Tax salary/rate monotonicity per state, Voter's age/birth-year constraint
from the paper's Table 5, zip→state style FDs). Golden DCs hold *exactly*
on clean data — tests assert zero violating pairs — so the §8.4 noise
experiments (G-recall) remain meaningful.

Value domains are engineered so that only the intended attribute pairs
share ≥30% common values: the predicate-space generator then creates
cross-column predicates exactly where the real datasets would have
comparable columns (see DESIGN.md §2).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np
import pandas as pd

from ..core.dc import DenialConstraint
from ..core.predicates import Op, Predicate

P = Predicate
DC = DenialConstraint.of


def _same(attr: str, op: Op) -> Predicate:
    """Two-tuple same-attribute predicate ``t.A op t'.A``."""
    return P(attr, op, attr)


@dataclass(frozen=True)
class DatasetSpec:
    """A generated dataset plus its golden DCs and the paper's Table-4 row."""

    name: str
    pdf: pd.DataFrame
    golden: tuple[DenialConstraint, ...]
    paper_tuples: int
    paper_attrs: int
    paper_golden: int

    @property
    def n_tuples(self) -> int:
        return len(self.pdf)

    @property
    def n_attrs(self) -> int:
        return len(self.pdf.columns)


# ---------------------------------------------------------------------------
# Running example (Table 1) and Example 1.1/1.2 DCs
# ---------------------------------------------------------------------------

def running_example() -> pd.DataFrame:
    """Table 1 of the paper: 15 tuples (Name, State, Zip, Income, Tax)."""
    rows = [
        ("Alice", "NY", "11803", 28.0, 2.4),
        ("Mark", "NY", "10102", 42.0, 4.7),
        ("Bob", "NY", "13914", 93.0, 11.8),
        ("Mary", "NY", "10437", 58.0, 6.7),
        ("Alice", "NY", "10437", 26.0, 2.1),
        ("Julia", "WA", "98112", 27.0, 1.4),
        ("Jimmy", "WA", "98112", 24.0, 1.6),
        ("Sam", "WA", "98112", 49.0, 6.8),
        ("Jeff", "WA", "98112", 56.0, 7.8),
        ("Gary", "WA", "98112", 50.0, 7.2),
        ("Ron", "WA", "98112", 58.0, 8.0),
        ("Jennifer", "WA", "98112", 61.0, 8.5),
        ("Adam", "WA", "98112", 20.0, 1.0),
        ("Tim", "IL", "62078", 39.0, 5.0),
        ("Sarah", "IL", "98112", 54.0, 5.0),
    ]
    return pd.DataFrame(rows, columns=["Name", "State", "Zip", "Income", "Tax"])


#: φ1 of Example 1.1: higher income ⇒ higher tax within a state.
PHI1 = DC(_same("State", Op.EQ), _same("Income", Op.GT), _same("Tax", Op.LE))
#: φ2 of Example 1.2: a zip code belongs to a single state.
PHI2 = DC(_same("Zip", Op.EQ), _same("State", Op.NE))


# ---------------------------------------------------------------------------
# Generator helpers
# ---------------------------------------------------------------------------

_FIRST = ["Alice", "Bob", "Carol", "Dan", "Eve", "Frank", "Grace", "Hugo",
          "Ivy", "Jack", "Karen", "Liam", "Mona", "Ned", "Olga", "Paul"]
_LAST = ["Smith", "Jones", "Brown", "Lee", "Wilson", "Clark", "Young",
         "King", "Hall", "Allen", "Wright", "Scott"]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _fd(values: np.ndarray, fmt: Callable[[int], object]) -> np.ndarray:
    """Deterministic functional image — plants an exact FD source→target."""
    return np.array([fmt(int(v)) for v in values], dtype=object)


# ---------------------------------------------------------------------------
# Tax (synthetic in the paper too): 15 attributes, 9 golden DCs
# ---------------------------------------------------------------------------

def tax(n: int = 1000, seed: int = 0) -> DatasetSpec:
    g = _rng(seed)
    n_states = 12
    state_id = g.integers(0, n_states, n)
    city_id = g.integers(0, 4, n)          # city within state
    zip_k = g.integers(0, 3, n)            # zip within city
    marital = g.choice(["S", "M", "D"], n)
    has_child = g.choice(["Y", "N"], n)
    salary = (g.integers(100, 1500, n) * 100).astype(np.int64)
    # rate strictly increases with salary within a state (golden g1)
    rate = np.round(10.0 + 0.5 * state_id + salary * 1e-4, 4)
    single_exemp = np.where(marital == "S", 2000, np.where(marital == "M", 50, 1000))
    married_exemp = np.where(marital == "M", 3000, 60)
    child_exemp = np.where(has_child == "Y", 1500, 70)
    pdf = pd.DataFrame(
        {
            "fname": g.choice(_FIRST, n),
            "lname": g.choice(_LAST, n),
            "gender": g.choice(["M", "F"], n),
            "area_code": _fd(state_id * 2 + g.integers(0, 2, n), lambda v: f"A{v:03d}"),
            "phone": [f"P{i:07d}" for i in range(n)],
            "city": _fd(state_id * 10 + city_id, lambda v: f"City{v:03d}"),
            "state": _fd(state_id, lambda v: f"ST{v:02d}"),
            "zip": _fd(state_id * 100 + city_id * 10 + zip_k, lambda v: f"Z{v:05d}"),
            "marital_status": marital,
            "has_child": has_child,
            "salary": salary,
            "rate": rate,
            "single_exemp": single_exemp.astype(np.int64),
            "married_exemp": married_exemp.astype(np.int64),
            "child_exemp": child_exemp.astype(np.int64),
        }
    )
    golden = (
        DC(_same("state", Op.EQ), _same("salary", Op.GT), _same("rate", Op.LT)),
        DC(_same("zip", Op.EQ), _same("state", Op.NE)),
        DC(_same("zip", Op.EQ), _same("city", Op.NE)),
        DC(_same("area_code", Op.EQ), _same("state", Op.NE)),
        DC(_same("phone", Op.EQ)),
        DC(_same("city", Op.EQ), _same("state", Op.NE)),
        DC(_same("marital_status", Op.EQ), _same("single_exemp", Op.NE)),
        DC(_same("marital_status", Op.EQ), _same("married_exemp", Op.NE)),
        DC(_same("has_child", Op.EQ), _same("child_exemp", Op.NE)),
    )
    return DatasetSpec("tax", pdf, golden, 1_000_000, 15, 9)


# ---------------------------------------------------------------------------
# SP Stock: 7 attributes, 6 golden DCs (OHLC ordering + key)
# ---------------------------------------------------------------------------

def stock(n: int = 1000, seed: int = 1) -> DatasetSpec:
    g = _rng(seed)
    n_tickers = 15
    ticker_id = np.arange(n) % n_tickers
    day = np.arange(n) // n_tickers
    low = 20.0 + 0.5 * g.integers(0, 80, n)
    spread = 0.5 * g.integers(1, 12, n)
    high = low + spread
    open_ = low + 0.5 * g.integers(0, 1 + (spread / 0.5).astype(int))
    close = low + 0.5 * g.integers(0, 1 + (spread / 0.5).astype(int))
    pdf = pd.DataFrame(
        {
            "ticker": _fd(ticker_id, lambda v: f"TK{v:02d}"),
            "trade_date": (20150101 + day).astype(np.int64),
            "open": open_,
            "high": high,
            "low": low,
            "close": close,
            "volume": (g.integers(100, 900, n) * 1000).astype(np.int64),
        }
    )
    golden = (
        DC(P("high", Op.LT, "low", single_tuple=True)),
        DC(P("open", Op.GT, "high", single_tuple=True)),
        DC(P("open", Op.LT, "low", single_tuple=True)),
        DC(P("high", Op.LT, "close", single_tuple=True)),
        DC(P("low", Op.GT, "close", single_tuple=True)),
        DC(_same("ticker", Op.EQ), _same("trade_date", Op.EQ)),
    )
    return DatasetSpec("stock", pdf, golden, 123_000, 7, 6)


# ---------------------------------------------------------------------------
# Hospital: 19 attributes, 7 golden DCs
# ---------------------------------------------------------------------------

def hospital(n: int = 1000, seed: int = 2) -> DatasetSpec:
    g = _rng(seed)
    n_providers = max(4, n // 8)
    provider = g.integers(0, n_providers, n)
    state_id = provider % 8
    county_id = provider % 20
    city_id = county_id * 2 + provider % 2      # city → county
    mc = g.integers(0, 10, n)                   # measure code
    pdf = pd.DataFrame(
        {
            "provider_id": _fd(provider, lambda v: f"PV{v:04d}"),
            "hospital_name": _fd(provider, lambda v: f"Hosp{v:04d}"),
            "address": _fd(provider, lambda v: f"{v} Main St"),
            "city": _fd(city_id, lambda v: f"City{v:03d}"),
            "state": _fd(state_id, lambda v: f"ST{v:02d}"),
            "zip": _fd(county_id * 4 + provider % 4, lambda v: f"Z{v:05d}"),
            "county": _fd(county_id, lambda v: f"Cnty{v:03d}"),
            "phone": _fd(provider, lambda v: f"P{v:07d}"),
            "hospital_type": _fd(provider % 3, lambda v: f"Type{v}"),
            "owner": _fd(provider % 5, lambda v: f"Owner{v}"),
            "emergency": _fd(provider % 2, lambda v: "YN"[v]),
            "condition": _fd(mc // 2, lambda v: f"Cond{v}"),
            "measure_code": _fd(mc, lambda v: f"MC{v:02d}"),
            "measure_name": _fd(mc, lambda v: f"Measure {v}"),
            "score": g.integers(0, 101, n).astype(np.int64),
            "sample_size": g.integers(1000, 9000, n).astype(np.int64),
            "stateavg": np.round(50.0 + 0.7 * state_id + 1.3 * mc, 1),
            "rating": (201 + g.integers(0, 5, n)).astype(np.int64),
            "region": _fd(state_id // 2, lambda v: f"Reg{v}"),
        }
    )
    # zip → state holds because zip embeds county (mod 20 of provider) only
    # when county → state; county_id % 8 != state_id in general, so derive
    # state from county instead to keep the FD chain sound.
    pdf["state"] = _fd(county_id % 8, lambda v: f"ST{v:02d}")
    pdf["stateavg"] = np.round(50.0 + 0.7 * (county_id % 8) + 1.3 * mc, 1)
    pdf["region"] = _fd((county_id % 8) // 2, lambda v: f"Reg{v}")
    golden = (
        DC(_same("measure_code", Op.EQ), _same("measure_name", Op.NE)),
        DC(_same("measure_code", Op.EQ), _same("condition", Op.NE)),
        DC(_same("state", Op.EQ), _same("measure_code", Op.EQ), _same("stateavg", Op.NE)),
        DC(_same("provider_id", Op.EQ), _same("hospital_name", Op.NE)),
        DC(_same("zip", Op.EQ), _same("state", Op.NE)),
        DC(_same("provider_id", Op.EQ), _same("phone", Op.NE)),
        DC(_same("city", Op.EQ), _same("county", Op.NE)),
    )
    return DatasetSpec("hospital", pdf, golden, 115_000, 19, 7)


# ---------------------------------------------------------------------------
# Food Inspection: 17 attributes, 10 golden DCs
# ---------------------------------------------------------------------------

def food(n: int = 1000, seed: int = 3) -> DatasetSpec:
    g = _rng(seed)
    n_lic = max(4, n // 6)
    lic = g.integers(0, n_lic, n)
    addr = lic % max(2, n_lic // 2)            # license → address (many-to-one ok)
    zip_id = addr % 30
    state_id = zip_id % 4
    pdf = pd.DataFrame(
        {
            "inspection_id": [f"I{i:07d}" for i in range(n)],
            "dba_name": _fd(lic, lambda v: f"Biz{v:04d}"),
            "aka_name": _fd(lic, lambda v: f"Aka{v:04d}"),
            "license_no": _fd(lic, lambda v: f"L{v:05d}"),
            "facility_type": _fd(lic % 4, lambda v: f"Fac{v}"),
            "risk": _fd(lic % 3, lambda v: f"Risk {v+1}"),
            "address": _fd(addr, lambda v: f"{v} W Elm St"),
            "city": _fd(zip_id // 3, lambda v: f"City{v:02d}"),
            "state": _fd(state_id, lambda v: f"ST{v:02d}"),
            "zip": _fd(zip_id, lambda v: f"Z{v:05d}"),
            "inspection_date": (20160000 + g.integers(101, 1231, n)).astype(np.int64),
            "inspection_type": g.choice(["Canvass", "Complaint", "License"], n),
            "results": g.choice(["Pass", "Fail", "Conditional"], n),
            "violation_no": g.integers(1, 60, n).astype(np.int64),
            "latitude": np.round(41.0 + 0.001 * addr, 3),
            "longitude": np.round(-87.0 - 0.002 * addr, 3),
            "ward": (400 + addr % 50).astype(np.int64),
        }
    )
    golden = (
        DC(_same("zip", Op.EQ), _same("state", Op.NE)),
        DC(_same("license_no", Op.EQ), _same("dba_name", Op.NE)),
        DC(_same("license_no", Op.EQ), _same("facility_type", Op.NE)),
        DC(_same("license_no", Op.EQ), _same("address", Op.NE)),
        DC(_same("inspection_id", Op.EQ)),
        DC(_same("address", Op.EQ), _same("zip", Op.NE)),
        DC(_same("address", Op.EQ), _same("latitude", Op.NE)),
        DC(_same("address", Op.EQ), _same("longitude", Op.NE)),
        DC(_same("zip", Op.EQ), _same("city", Op.NE)),
        DC(_same("address", Op.EQ), _same("ward", Op.NE)),
    )
    return DatasetSpec("food", pdf, golden, 200_000, 17, 10)


# ---------------------------------------------------------------------------
# Airport: 12 attributes, 9 golden DCs
# ---------------------------------------------------------------------------

def airport(n: int = 1000, seed: int = 4) -> DatasetSpec:
    g = _rng(seed)
    city_id = g.integers(0, max(3, n // 5), n)
    state_id = city_id % 10
    country_id = state_id % 3
    tz = -8 + state_id % 4                      # state → tz
    pdf = pd.DataFrame(
        {
            "iata": [f"A{i:03d}" for i in range(n)],
            "airport_name": [f"Airport {i}" for i in range(n)],
            "city": _fd(city_id, lambda v: f"City{v:03d}"),
            "state": _fd(state_id, lambda v: f"ST{v:02d}"),
            "country": _fd(country_id, lambda v: ["US", "CA", "MX"][v]),
            "latitude": np.round(25.0 + 0.01 * city_id + 0.001 * g.integers(0, 9, n), 3),
            "longitude": np.round(-120.0 + 0.02 * city_id, 3),
            "elevation": (g.integers(0, 300, n) * 10).astype(np.int64),
            "tz_offset": tz.astype(np.int64),
            "dst": _fd((tz % 2 + 2) % 2, lambda v: "YN"[v]),   # tz → dst
            "facility_type": g.choice(["public", "private", "military"], n),
            "owner": g.choice(["state", "city", "federal", "private"], n),
        }
    )
    golden = (
        DC(_same("iata", Op.EQ)),
        DC(_same("airport_name", Op.EQ)),
        DC(_same("city", Op.EQ), _same("state", Op.NE)),
        DC(_same("state", Op.EQ), _same("country", Op.NE)),
        DC(_same("city", Op.EQ), _same("country", Op.NE)),
        DC(_same("state", Op.EQ), _same("tz_offset", Op.NE)),
        DC(_same("city", Op.EQ), _same("tz_offset", Op.NE)),
        DC(_same("state", Op.EQ), _same("dst", Op.NE)),
        DC(_same("tz_offset", Op.EQ), _same("dst", Op.NE)),
    )
    return DatasetSpec("airport", pdf, golden, 55_000, 12, 9)


# ---------------------------------------------------------------------------
# Adult: 15 attributes, 3 golden DCs
# ---------------------------------------------------------------------------

def adult(n: int = 1000, seed: int = 5) -> DatasetSpec:
    g = _rng(seed)
    edu = g.integers(0, 16, n)
    pdf = pd.DataFrame(
        {
            "age": g.integers(17, 91, n).astype(np.int64),
            "workclass": g.choice(["Private", "SelfEmp", "Gov", "Other"], n),
            "fnlwgt": (100000 + np.arange(n)).astype(np.int64),
            "education": _fd(edu, lambda v: f"Edu{v:02d}"),
            "education_num": (edu + 1).astype(np.int64),
            "marital_status": g.choice(["Married", "Single", "Divorced"], n),
            "occupation": g.choice(["Tech", "Sales", "Admin", "Service", "Exec"], n),
            "relationship": g.choice(["Husband", "Wife", "Own-child", "Unmarried"], n),
            "race": g.choice(["White", "Black", "Asian", "Other"], n),
            "sex": g.choice(["Male", "Female"], n),
            "capital_gain": np.where(g.random(n) < 0.1, g.integers(2000, 20000, n), 0).astype(np.int64),
            "capital_loss": np.where(g.random(n) < 0.05, g.integers(200, 1900, n), 0).astype(np.int64),
            "hours_per_week": g.integers(1, 100, n).astype(np.int64),
            "native_country": g.choice(["US", "MX", "PH", "DE", "CA"], n),
            "income": g.choice(["<=50K", ">50K"], n),
        }
    )
    golden = (
        DC(_same("education", Op.EQ), _same("education_num", Op.NE)),
        DC(_same("education_num", Op.EQ), _same("education", Op.NE)),
        DC(_same("fnlwgt", Op.EQ)),
    )
    return DatasetSpec("adult", pdf, golden, 32_000, 15, 3)


# ---------------------------------------------------------------------------
# Flight: 20 attributes, 13 golden DCs
# ---------------------------------------------------------------------------

def flight(n: int = 1000, seed: int = 6) -> DatasetSpec:
    g = _rng(seed)
    n_airports = 12
    route = g.integers(0, n_airports * (n_airports - 1), n)
    o = route // (n_airports - 1)
    d_raw = route % (n_airports - 1)
    d = np.where(d_raw >= o, d_raw + 1, d_raw)      # dest ≠ origin
    carrier = g.integers(0, 5, n)
    # (carrier, flight_no) → route, but flight_no alone does not determine
    # the route — keeps the carrier predicate non-redundant in the goldens
    fno = 1000 + (route + 13 * carrier) % 132
    distance = (2000 + (o * 31 + d * 17) % 1500 * 2).astype(np.int64)
    # all times/delays live on a coarse 100-minute grid: the four time
    # columns then share well over 30% common values even at n≈30, so the
    # single-tuple order predicates (dep<arr etc.) are reliably generated
    sched_el = (100 * (3 + distance // 1000)).astype(np.int64)      # route → elapsed
    sched_dep = (1_000_000 + 100 * g.integers(0, 30, n)).astype(np.int64)
    sched_arr = sched_dep + sched_el
    dep_delay = (100 * g.integers(1, 4, n)).astype(np.int64)        # ≥ 100, grid 100
    delta = (100 * g.integers(-1, 2, n)).astype(np.int64)
    act_dep = sched_dep + dep_delay
    act_el = sched_el + delta
    act_arr = act_dep + act_el
    city_o = o % 10                                  # airport → city
    city_d = d % 10
    pdf = pd.DataFrame(
        {
            "carrier": _fd(carrier, lambda v: f"CR{v}"),
            "flight_no": fno.astype(np.int64),
            "origin": _fd(o, lambda v: f"AP{v:02d}"),
            "origin_city": _fd(city_o, lambda v: f"City{v:02d}"),
            "origin_state": _fd(city_o % 6, lambda v: f"ST{v:02d}"),
            "dest": _fd(d, lambda v: f"AP{v:02d}"),
            "dest_city": _fd(city_d, lambda v: f"City{v:02d}"),
            "dest_state": _fd(city_d % 6, lambda v: f"ST{v:02d}"),
            "sched_dep": sched_dep,
            "sched_arr": sched_arr,
            "act_dep": act_dep,
            "act_arr": act_arr,
            "sched_elapsed": sched_el,
            "act_elapsed": act_el,
            "dep_delay": dep_delay,
            "arr_delay": (dep_delay + delta).astype(np.int64),
            "taxi_out": (5 + 2 * g.integers(0, 20, n)).astype(np.int64),  # odd: no
            "taxi_in": (5 + 2 * g.integers(0, 20, n)).astype(np.int64),   # delay overlap
            "air_time": (10000 + distance * 2).astype(np.int64),
            "distance": distance,
        }
    )
    golden = (
        DC(_same("origin", Op.EQ), _same("origin_city", Op.NE)),
        DC(_same("origin", Op.EQ), _same("origin_state", Op.NE)),
        DC(_same("dest", Op.EQ), _same("dest_city", Op.NE)),
        DC(_same("dest", Op.EQ), _same("dest_state", Op.NE)),
        DC(_same("origin_city", Op.EQ), _same("origin_state", Op.NE)),
        DC(_same("dest_city", Op.EQ), _same("dest_state", Op.NE)),
        DC(P("act_dep", Op.GT, "act_arr", single_tuple=True)),
        DC(P("sched_dep", Op.GT, "sched_arr", single_tuple=True)),
        DC(P("sched_dep", Op.GE, "act_dep", single_tuple=True)),   # no early departures
        DC(_same("origin", Op.EQ), _same("dest", Op.EQ), _same("distance", Op.NE)),
        DC(_same("sched_elapsed", Op.GT), _same("distance", Op.LT)),
        DC(_same("carrier", Op.EQ), _same("flight_no", Op.EQ), _same("origin", Op.NE)),
        DC(_same("carrier", Op.EQ), _same("flight_no", Op.EQ), _same("dest", Op.NE)),
    )
    return DatasetSpec("flight", pdf, golden, 582_000, 20, 13)


# ---------------------------------------------------------------------------
# NC Voter: 25 attributes, 12 golden DCs
# ---------------------------------------------------------------------------

def voter(n: int = 1000, seed: int = 7) -> DatasetSpec:
    g = _rng(seed)
    county = g.integers(0, 16, n)
    zip_k = g.integers(0, 4, n)
    precinct = county * 20 + g.integers(0, 6, n)
    birth_year = g.integers(1930, 2003, n).astype(np.int64)
    status = g.integers(0, 5, n)
    pdf = pd.DataFrame(
        {
            "voter_id": [f"V{i:07d}" for i in range(n)],
            "first_name": g.choice(_FIRST, n),
            "middle_name": g.choice(list("ABCDEFG"), n),
            "last_name": g.choice(_LAST, n),
            "name_suffix": g.choice(["", "JR", "SR", "III"], n),
            "age": (2020 - birth_year).astype(np.int64),
            "birth_year": birth_year,
            "gender": g.choice(["M", "F", "U"], n),
            "race": g.choice(["W", "B", "A", "O"], n),
            "ethnicity": g.choice(["HL", "NL", "UN"], n),
            "street_address": [f"{i % 97} Oak Ave" for i in range(n)],
            "city": _fd(county * 4 + zip_k // 2, lambda v: f"City{v:03d}"),
            "state": _fd(county % 4, lambda v: f"ST{v:02d}"),
            "zip": _fd(county * 4 + zip_k, lambda v: f"Z{v:05d}"),
            "county": _fd(county, lambda v: f"Cnty{v:02d}"),
            "precinct": _fd(precinct, lambda v: f"PR{v:03d}"),
            "phone": [f"P{i:07d}" for i in range(n)],
            "party": g.choice(["DEM", "REP", "UNA", "LIB"], n),
            "registration_date": (19900000 + g.integers(101, 1231, n) + 10000 * g.integers(0, 25, n)).astype(np.int64),
            "status": _fd(status, lambda v: f"S{v}"),
            "reason": _fd(status, lambda v: f"Reason{v}"),
            "congressional_district": (100 + county % 8).astype(np.int64),
            "senate_district": (200 + county % 15).astype(np.int64),
            "house_district": (300 + county % 40).astype(np.int64),
            "ward": (10 + precinct % 10).astype(np.int64),
        }
    )
    golden = (
        DC(_same("age", Op.LT), _same("birth_year", Op.LT)),   # Table 5 of the paper
        DC(_same("birth_year", Op.EQ), _same("age", Op.NE)),
        DC(_same("voter_id", Op.EQ)),
        DC(_same("zip", Op.EQ), _same("state", Op.NE)),
        DC(_same("zip", Op.EQ), _same("city", Op.NE)),
        DC(_same("city", Op.EQ), _same("county", Op.NE)),
        DC(_same("county", Op.EQ), _same("congressional_district", Op.NE)),
        DC(_same("precinct", Op.EQ), _same("county", Op.NE)),
        DC(_same("precinct", Op.EQ), _same("ward", Op.NE)),
        DC(_same("county", Op.EQ), _same("senate_district", Op.NE)),
        DC(_same("county", Op.EQ), _same("house_district", Op.NE)),
        DC(_same("status", Op.EQ), _same("reason", Op.NE)),
    )
    return DatasetSpec("voter", pdf, golden, 950_000, 25, 12)


#: name → generator, in the paper's Table-4 order
DATASETS: dict[str, Callable[..., DatasetSpec]] = {
    "tax": tax,
    "stock": stock,
    "hospital": hospital,
    "food": food,
    "airport": airport,
    "adult": adult,
    "flight": flight,
    "voter": voter,
}

"""Synthetic clean generators for the paper's six evaluation datasets.

The real Hospital/Flights/Soccer/Beers/Inpatient/Facilities files are
not available offline, so each generator reproduces the *shape* the
paper's analysis depends on (DESIGN.md §1): same schema and row counts
(Soccer scaled 200k→20k), FD-rich causal structure between attributes,
and heavy value duplication so that correct repairs exist in each
attribute's observed domain.

All generators return a clean pandas DataFrame of strings with a
``tid`` column; error injection (``errors.py``) derives the dirty
version. Everything is deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

__all__ = [
    "hospital", "flights", "soccer", "beers", "inpatient", "facilities",
    "GENERATORS",
]

_STATES = [
    "AL", "AK", "AZ", "AR", "CA", "CO", "CT", "DE", "FL", "GA", "HI",
    "ID", "IL", "IN", "IA", "KS", "KY", "LA", "ME", "MD", "MA", "MI",
    "MN", "MS", "MO", "MT", "NE", "NV", "NH", "NJ",
]
_STREETS = [
    "hickory st", "northwood dr", "main st", "oak ave", "maple rd",
    "pine ln", "cedar blvd", "elm st", "lake dr", "hill rd",
    "sunset ave", "park pl", "river rd", "forest way", "meadow ln",
]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _cities(g: np.random.Generator, n: int) -> pd.DataFrame:
    """A pool of cities, each with a determined state / zip / county —
    the City→{State, ZipCode, County} FD backbone shared by schemas."""
    first = ["clear", "spring", "oak", "cedar", "river", "stone", "fair",
             "green", "lake", "mill", "sand", "iron", "ash", "birch"]
    second = ["field", "ville", "ton", "wood", "dale", "port", "burg",
              "ford", "view", "haven"]
    names, seen = [], set()
    while len(names) < n:
        c = g.choice(first) + g.choice(second)
        if c not in seen:
            seen.add(c)
            names.append(c)
    return pd.DataFrame({
        "city": names,
        "state": g.choice(_STATES, n),
        "zip": [f"{z:05d}" for z in g.integers(10000, 99999, n)],
        "county": [f"{c} county" for c in g.choice(first, n)],
    })


def _address(g: np.random.Generator) -> str:
    return f"{int(g.integers(100, 999))} {g.choice(['n', 's', 'e', 'w'])} {g.choice(_STREETS)}"


def hospital(n_rows: int = 1000, seed: int = 0) -> pd.DataFrame:
    """Hospital: 15 attributes, ~5% noise in the paper. Rows are
    (hospital, measure) pairs; hospital-level attributes are determined
    by ProviderNumber and measure-level by MeasureCode; StateAvg is
    determined by (State, MeasureCode)."""
    g = _rng(seed)
    n_hosp = max(8, n_rows // 16)
    cities = _cities(g, max(6, n_hosp // 2))
    hosp = pd.DataFrame({
        "ProviderNumber": [f"{10001 + i}" for i in range(n_hosp)],
        "city_idx": g.integers(0, len(cities), n_hosp),
        "PhoneNumber": [f"{p}" for p in g.integers(2005550000, 9995559999, n_hosp)],
        "HospitalType": g.choice(
            ["acute care hospitals", "critical access hospitals",
             "childrens hospitals"], n_hosp),
        "HospitalOwner": g.choice(
            ["government - state", "voluntary non-profit - private",
             "proprietary", "government - federal",
             "voluntary non-profit - church"], n_hosp),
        "EmergencyService": g.choice(["yes", "no"], n_hosp),
    })
    hosp["Address"] = [_address(g) for _ in range(n_hosp)]
    hosp["City"] = cities["city"].to_numpy()[hosp["city_idx"]]
    hosp["State"] = cities["state"].to_numpy()[hosp["city_idx"]]
    hosp["ZipCode"] = cities["zip"].to_numpy()[hosp["city_idx"]]
    hosp["CountyName"] = cities["county"].to_numpy()[hosp["city_idx"]]
    hosp["HospitalName"] = hosp["City"] + " medical center"

    conds = ["heart attack", "heart failure", "pneumonia",
             "surgical infection prevention", "children asthma", "stroke"]
    n_meas = 24
    meas = pd.DataFrame({
        "MeasureCode": [f"mc-{i:02d}" for i in range(n_meas)],
        "Condition": [conds[i % len(conds)] for i in range(n_meas)],
    })
    meas["MeasureName"] = meas["Condition"] + " measure " + meas["MeasureCode"]

    hi = g.integers(0, n_hosp, n_rows)
    mi = g.integers(0, n_meas, n_rows)
    df = pd.concat(
        [hosp.drop(columns="city_idx").iloc[hi].reset_index(drop=True),
         meas.iloc[mi].reset_index(drop=True)], axis=1)
    df["StateAvg"] = df["State"] + "_" + df["MeasureCode"] + "_avg"
    df.insert(0, "tid", np.arange(n_rows).astype(str))
    cols = ["tid", "ProviderNumber", "HospitalName", "Address", "City",
            "State", "ZipCode", "CountyName", "PhoneNumber", "HospitalType",
            "HospitalOwner", "EmergencyService", "Condition", "MeasureCode",
            "MeasureName", "StateAvg"]
    return df[cols].astype(str)


def _clock(g: np.random.Generator) -> str:
    h = int(g.integers(1, 13))
    mnt = int(g.integers(0, 60))
    ap = g.choice(["a.m.", "p.m."])
    return f"{h}:{mnt:02d} {ap}"


def flights(n_rows: int = 2376, seed: int = 1) -> pd.DataFrame:
    """Flights: 6 attributes, ~30% noise in the paper. Each flight has
    fixed scheduled/actual times (FD flight→times); rows replicate each
    flight across booking websites, mirroring the truth-finding corpus."""
    g = _rng(seed)
    n_src = 22
    n_flight = max(4, (n_rows + n_src - 1) // n_src)
    carriers = ["AA", "UA", "DL", "CO", "WN"]
    fl = pd.DataFrame({
        "flight": [f"{g.choice(carriers)}-{1000 + i}-den-ord"
                   for i in range(n_flight)],
        "sched_dep_time": [_clock(g) for _ in range(n_flight)],
        "act_dep_time": [_clock(g) for _ in range(n_flight)],
        "sched_arr_time": [_clock(g) for _ in range(n_flight)],
        "act_arr_time": [_clock(g) for _ in range(n_flight)],
    })
    srcs = [f"site{i:02d}" for i in range(n_src)]
    rows = [(s, f) for f in range(n_flight) for s in range(n_src)][:n_rows]
    df = fl.iloc[[f for _, f in rows]].reset_index(drop=True)
    df.insert(0, "src", [srcs[s] for s, _ in rows])
    df.insert(0, "tid", np.arange(len(df)).astype(str))
    return df.astype(str)


def soccer(n_rows: int = 20000, seed: int = 2) -> pd.DataFrame:
    """Soccer: 10 attributes, ~1% noise. Player-season rows; player
    attributes determined by name, team attributes determined by team."""
    g = _rng(seed)
    n_player = max(10, n_rows // 10)
    n_team = max(4, n_rows // 500)
    cities = _cities(g, n_team)
    surnames = [f"sur{i:03d}" for i in range(300)]
    players = pd.DataFrame({
        "name": [f"player{i:05d}" for i in range(n_player)],
        "surname": g.choice(surnames, n_player),
        "birthyear": [str(y) for y in g.integers(1960, 2000, n_player)],
        "birthplace": cities["city"].to_numpy()[g.integers(0, len(cities), n_player)],
        "position": g.choice(
            ["goalkeeper", "defender", "midfielder", "forward", "winger",
             "striker", "sweeper", "fullback", "wingback", "playmaker"],
            n_player),
    })
    teams = pd.DataFrame({
        "team": [f"fc {c}" for c in cities["city"]],
        "city": cities["city"],
        "stadium": [f"{c} arena" for c in cities["city"]],
        "manager": [f"manager{i:03d}" for i in range(n_team)],
    })
    seasons = [str(y) for y in range(2009, 2018)]
    pi = g.integers(0, n_player, n_rows)
    si = g.integers(0, len(seasons), n_rows)
    # Team is a deterministic function of (player, season) so the data
    # is consistent but teams change across seasons.
    ti = (pi * 7 + si * 13) % n_team
    df = pd.concat(
        [players.iloc[pi].reset_index(drop=True),
         teams.iloc[ti].reset_index(drop=True)], axis=1)
    df["season"] = [seasons[i] for i in si]
    df.insert(0, "tid", np.arange(n_rows).astype(str))
    return df.astype(str)


def beers(n_rows: int = 2410, seed: int = 3) -> pd.DataFrame:
    """Beers: 11 attributes with two numeric ones (ounces, abv) as in
    the paper. Brewery attributes determined by brewery_id; abv/ibu
    determined by style (grid-valued so repairs exist in the domain)."""
    g = _rng(seed)
    n_brew = max(6, n_rows // 20)
    cities = _cities(g, max(4, n_brew // 3))
    styles = ["american ipa", "american pale ale", "american lager",
              "fruit beer", "american porter", "american stout",
              "saison", "witbier", "kolsch", "pilsner", "amber ale",
              "brown ale", "hefeweizen", "cream ale", "blonde ale"]
    abv_grid = {s: f"{0.04 + 0.005 * (i % 9):.3f}" for i, s in enumerate(styles)}
    ibu_grid = {s: str(15 + 5 * (i % 12)) for i, s in enumerate(styles)}
    brew = pd.DataFrame({
        "brewery_id": [str(i) for i in range(n_brew)],
        "city_idx": g.integers(0, len(cities), n_brew),
    })
    # Brewery names are unique (adjective + city + serial) so the FD
    # brewery_name → brewery_id holds, as in the real catalog.
    brew["brewery_name"] = [
        f"{cities['city'][i]} brewing co {k}"
        for k, i in enumerate(brew["city_idx"])
    ]
    brew["city"] = cities["city"].to_numpy()[brew["city_idx"]]
    brew["state"] = cities["state"].to_numpy()[brew["city_idx"]]
    # Canonical package size per brewery (FD brewery_id → ounces), as
    # in the real data where a brewery cans at one or two sizes.
    brew["ounces"] = g.choice(
        ["12.0", "16.0", "24.0", "32.0", "8.4", "19.2"], n_brew,
        p=[0.5, 0.25, 0.1, 0.05, 0.05, 0.05])
    adjectives = ["hoppy", "golden", "dark", "wild", "old", "midnight",
                  "summer", "winter", "copper", "red"]
    nouns = ["trail", "river", "peak", "badger", "otter", "moon", "sun",
             "canyon", "harvest", "anchor"]
    bi = g.integers(0, n_brew, n_rows)
    st = g.choice(styles, n_rows)
    avail_grid = {s: ["year-round", "seasonal", "limited"][i % 3]
                  for i, s in enumerate(styles)}
    df = pd.DataFrame({
        "id": [str(1000 + i) for i in range(n_rows)],
        "beer_name": [f"{g.choice(adjectives)} {g.choice(nouns)} "
                      f"{st[i].split()[-1]}" for i in range(n_rows)],
        "style": st,
        "abv": [abv_grid[s] for s in st],
        "ibu": [ibu_grid[s] for s in st],
    })
    df = pd.concat(
        [df, brew.drop(columns="city_idx").iloc[bi].reset_index(drop=True)],
        axis=1)
    # Availability is determined by style (seasonal styles), giving the
    # attribute a causal anchor like the real catalog data.
    df["availability"] = [avail_grid[s] for s in st]
    df.insert(0, "tid", np.arange(n_rows).astype(str))
    return df.astype(str)


def inpatient(n_rows: int = 4017, seed: int = 4) -> pd.DataFrame:
    """Inpatient (CMS): provider profile × DRG rows. Provider attributes
    determined by provider_id; drg_desc and avg_charges by drg_code."""
    g = _rng(seed)
    n_prov = max(8, n_rows // 31)
    cities = _cities(g, max(5, n_prov // 3))
    ci = g.integers(0, len(cities), n_prov)
    prov = pd.DataFrame({
        "provider_id": [f"{20001 + i}" for i in range(n_prov)],
        "provider_name": [f"{cities['city'][c]} general hospital" for c in ci],
        "address": [_address(g) for _ in range(n_prov)],
        "city": cities["city"].to_numpy()[ci],
        "state": cities["state"].to_numpy()[ci],
        "zip": cities["zip"].to_numpy()[ci],
        "county": cities["county"].to_numpy()[ci],
    })
    n_drg = 31
    drg = pd.DataFrame({
        "drg_code": [f"{190 + i}" for i in range(n_drg)],
        "drg_desc": [f"procedure group {190 + i} w cc" for i in range(n_drg)],
        "avg_charges": [f"{20000 + 1500 * i}.00" for i in range(n_drg)],
        # Typical discharge volume per DRG (FD drg_code → discharges),
        # giving the numeric attribute a causal anchor.
        "discharges": [str(11 + (i * 7) % 29) for i in range(n_drg)],
    })
    pi = g.integers(0, n_prov, n_rows)
    di = g.integers(0, n_drg, n_rows)
    df = pd.concat(
        [prov.iloc[pi].reset_index(drop=True),
         drg.iloc[di].reset_index(drop=True)], axis=1)
    df.insert(0, "tid", np.arange(n_rows).astype(str))
    return df.astype(str)


def facilities(n_rows: int = 7992, seed: int = 5) -> pd.DataFrame:
    """Facilities (CMS): medical-enterprise records; profile attributes
    determined by facility_id, replicated across certification rows."""
    g = _rng(seed)
    n_fac = max(8, n_rows // 10)
    cities = _cities(g, max(6, n_fac // 8))
    ci = g.integers(0, len(cities), n_fac)
    fac = pd.DataFrame({
        "facility_id": [f"F{30001 + i}" for i in range(n_fac)],
        "facility_name": [f"{cities['city'][c]} care center" for c in ci],
        "address": [_address(g) for _ in range(n_fac)],
        "city": cities["city"].to_numpy()[ci],
        "state": cities["state"].to_numpy()[ci],
        "zip": cities["zip"].to_numpy()[ci],
        "county": cities["county"].to_numpy()[ci],
        "phone": [f"{p}" for p in g.integers(2005550000, 9995559999, n_fac)],
        "facility_type": g.choice(
            ["nursing home", "dialysis facility", "home health agency",
             "hospice", "rehabilitation center", "long term care"], n_fac),
        "ownership": g.choice(
            ["for profit", "non profit", "government", "church related"],
            n_fac),
    })
    fi = g.integers(0, n_fac, n_rows)
    df = fac.iloc[fi].reset_index(drop=True)
    df["certification"] = g.choice(
        ["medicare", "medicaid", "medicare and medicaid", "state only"],
        n_rows)
    df.insert(0, "tid", np.arange(n_rows).astype(str))
    return df.astype(str)


GENERATORS = {
    "hospital": (hospital, 1000),
    "flights": (flights, 2376),
    "soccer": (soccer, 20000),
    "beers": (beers, 2410),
    "inpatient": (inpatient, 4017),
    "facilities": (facilities, 7992),
}

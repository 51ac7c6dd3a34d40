"""Per-dataset user constraints (paper Table 3) and BN user edits (§7.3.2).

The paper's experts wrote format-based UCs per attribute — regular
expressions for structured fields (zip, phone, clock times, years),
max/min length constraints for all textual attributes, and not-null
constraints for every attribute. We author the same style of
constraints against our synthetic schemas, never encoding specific
ground-truth values (the paper: "we avoid using specific values in
regular expressions to prevent the leakage of ground truth").

``BN_EDITS`` mirrors the paper's user-interaction adjustments: for
Flights the auto-learned structure is unreliable (§7.3.2 reports
precision 0.217 before user edits) and the user wires flight → times;
for Hospital the user adds State → StateAvg.
"""
from __future__ import annotations

from repro.core.constraints import UC

__all__ = ["dataset_ucs", "BN_EDITS", "NUMERIC_ATTRS", "ERROR_ATTRS"]

_CLOCK = r"(1[0-2]|[1-9]):[0-5][0-9] [ap]\.m\."


def _textual(max_len: int, min_len: int = 2) -> UC:
    return UC(min_len=min_len, max_len=max_len)


def dataset_ucs(name: str) -> dict[str, UC]:
    if name == "hospital":
        return {
            "ProviderNumber": UC(pattern=r"[1-9][0-9]{4}"),
            "HospitalName": _textual(40),
            "Address": _textual(40, 5),
            "City": _textual(20, 3),
            "State": UC(pattern=r"[a-zA-Z]{2}"),
            "ZipCode": UC(pattern=r"[1-9][0-9]{4}"),
            "CountyName": _textual(30, 4),
            "PhoneNumber": UC(pattern=r"[1-9][0-9]{9}"),
            "HospitalType": _textual(40, 5),
            "HospitalOwner": _textual(40, 5),
            "EmergencyService": UC(min_len=2, max_len=3),
            "Condition": _textual(40, 5),
            "MeasureCode": UC(pattern=r"mc-[0-9]{2}"),
            "MeasureName": _textual(60, 8),
            "StateAvg": UC(pattern=r"[A-Z]{2}_mc-[0-9]{2}_avg"),
        }
    if name == "flights":
        return {
            "src": _textual(12, 3),
            "flight": _textual(20, 8),
            "sched_dep_time": UC(pattern=_CLOCK),
            "act_dep_time": UC(pattern=_CLOCK),
            "sched_arr_time": UC(pattern=_CLOCK),
            "act_arr_time": UC(pattern=_CLOCK),
        }
    if name == "soccer":
        return {
            "name": _textual(16, 6),
            "surname": _textual(10, 4),
            "birthyear": UC(pattern=r"19[6-9][0-9]"),
            "birthplace": _textual(20, 4),
            "position": _textual(12, 6),
            "team": _textual(24, 4),
            "city": _textual(20, 4),
            "stadium": _textual(26, 6),
            "season": UC(pattern=r"20[0-2][0-9]"),
            "manager": _textual(12, 8),
        }
    if name == "beers":
        return {
            "id": UC(pattern=r"[0-9]+"),
            "beer_name": _textual(40, 5),
            "style": _textual(30, 4),
            "ounces": UC(pattern=r"[0-9]+\.[0-9]+", min_value=1.0,
                         max_value=64.0),
            "abv": UC(pattern=r"0\.[0-9]+", min_value=0.01, max_value=0.2),
            "ibu": UC(pattern=r"[0-9]+", min_value=1, max_value=200),
            "brewery_id": UC(pattern=r"[0-9]+"),
            "brewery_name": _textual(40, 5),
            "city": _textual(20, 3),
            "state": UC(pattern=r"[a-zA-Z]{2}"),
            "availability": _textual(12, 5),
        }
    if name == "inpatient":
        # Paper Table 3 marks Inpatient regexes N/A: only length / value
        # / not-null constraints.
        return {
            "provider_id": UC(min_len=5, max_len=5),
            "provider_name": _textual(40, 8),
            "address": _textual(40, 5),
            "city": _textual(20, 3),
            "state": UC(min_len=2, max_len=2),
            "zip": UC(min_len=5, max_len=5),
            "county": _textual(30, 6),
            "drg_code": UC(min_len=3, max_len=3),
            "drg_desc": _textual(40, 10),
            "discharges": UC(min_len=2, max_len=3),
            "avg_charges": UC(min_len=7, max_len=9),
        }
    if name == "facilities":
        # Paper Table 3 marks Facilities regexes N/A as well.
        return {
            "facility_id": UC(min_len=6, max_len=6),
            "facility_name": _textual(30, 8),
            "address": _textual(40, 5),
            "city": _textual(20, 3),
            "state": UC(min_len=2, max_len=2),
            "zip": UC(min_len=5, max_len=5),
            "county": _textual(30, 6),
            "phone": UC(min_len=10, max_len=10),
            "facility_type": _textual(22, 6),
            "ownership": _textual(16, 8),
            "certification": _textual(22, 8),
        }
    raise KeyError(f"unknown dataset {name!r}")


# User interactions on the auto-learned BN (§7.3.2): performed after the
# automatic construction, before CPT (re-)estimation.
BN_EDITS: dict[str, list[tuple]] = {
    "hospital": [("add", "State", "StateAvg"), ("add", "MeasureCode", "StateAvg")],
    "flights": [
        ("add", "flight", "sched_dep_time"),
        ("add", "flight", "act_dep_time"),
        ("add", "flight", "sched_arr_time"),
        ("add", "flight", "act_arr_time"),
    ],
    "soccer": [],
    "beers": [],
    "inpatient": [],
    "facilities": [],
}

# Attributes treated as numeric by the similarity kernel (§4).
NUMERIC_ATTRS: dict[str, set[str]] = {
    "hospital": set(),
    "flights": set(),
    # Years are labels, not quantities: edit similarity ("1984" vs
    # "1985") carries the FD signal the numeric kernel washes out.
    "soccer": set(),
    "beers": {"ounces", "abv", "ibu"},
    "inpatient": {"discharges", "avg_charges"},
    "facilities": set(),
}

# Columns receiving injected errors (unique row ids are excluded, as
# repairs for singleton values cannot exist in the observed domain).
ERROR_ATTRS: dict[str, list[str] | None] = {
    "hospital": None,  # None -> all non-tid columns
    "flights": None,
    "soccer": None,
    # id and beer_name are quasi-unique (singleton values); repairs for
    # them cannot exist in the observed domain, so — as in the real
    # benchmark, where errors concentrate in the repairable fields —
    # they receive no injected errors.
    "beers": ["style", "ounces", "abv", "ibu", "brewery_id",
              "brewery_name", "city", "state", "availability"],
    "inpatient": None,
    "facilities": None,
}

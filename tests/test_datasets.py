"""Invariants of the synthetic dataset generators (Table 2 substrate)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import uc_mask
from repro.datasets.registry import DATASETS, PAPER_TABLE2, load_task
from repro.datasets.schemas import (GENERATORS, beers, facilities, flights,
                                    hospital, inpatient, soccer)
from repro.datasets.ucs import dataset_ucs

SMALL = {"hospital": 0.3, "flights": 0.2, "soccer": 0.02, "beers": 0.2,
         "inpatient": 0.12, "facilities": 0.08}


@pytest.fixture(scope="module")
def tasks():
    return {n: load_task(n, scale=SMALL[n], seed=3) for n in DATASETS}


@pytest.mark.parametrize("name", DATASETS)
def test_schema_matches_table2(name):
    gen, default_rows = GENERATORS[name]
    rows, cols, _, _, _, n_ucs = PAPER_TABLE2[name]
    pdf = gen(60, seed=0)
    assert len(pdf.columns) - 1 == cols  # minus tid
    assert len(dataset_ucs(name)) == n_ucs


@pytest.mark.parametrize("name", DATASETS)
def test_default_rows_match_paper(name):
    _, default_rows = GENERATORS[name]
    paper_rows = PAPER_TABLE2[name][0]
    if name == "soccer":
        assert default_rows == 20000  # documented 10× scale-down
    else:
        assert default_rows == paper_rows


@pytest.mark.parametrize("name", DATASETS)
def test_generator_deterministic(name):
    gen, _ = GENERATORS[name]
    a = gen(80, seed=5)
    b = gen(80, seed=5)
    pd.testing.assert_frame_equal(a, b)
    c = gen(80, seed=6)
    assert not a.drop(columns="tid").equals(c.drop(columns="tid"))


@pytest.mark.parametrize("name", DATASETS)
def test_all_values_are_strings(name):
    gen, _ = GENERATORS[name]
    pdf = gen(50, seed=1)
    assert (pdf.dtypes == object).all()
    assert pdf.notna().all().all()


@pytest.mark.parametrize("name", DATASETS)
def test_clean_data_satisfies_all_ucs(tasks, name):
    t = tasks[name]
    for a in t.attrs:
        mask = uc_mask(t.ucs, a, t.clean[a])
        assert mask.all(), f"{name}.{a}: clean data violates its UC"


@pytest.mark.parametrize("name,lhs,rhs", [
    ("hospital", "ProviderNumber", "HospitalName"),
    ("hospital", "City", "State"),
    ("hospital", "City", "ZipCode"),
    ("hospital", "MeasureCode", "MeasureName"),
    ("hospital", "MeasureCode", "Condition"),
    ("flights", "flight", "sched_dep_time"),
    ("flights", "flight", "act_arr_time"),
    ("soccer", "name", "surname"),
    ("soccer", "name", "birthyear"),
    ("soccer", "team", "city"),
    ("soccer", "team", "manager"),
    ("beers", "brewery_id", "brewery_name"),
    ("beers", "brewery_id", "ounces"),
    ("beers", "style", "abv"),
    ("beers", "style", "availability"),
    ("inpatient", "provider_id", "zip"),
    ("inpatient", "drg_code", "avg_charges"),
    ("inpatient", "drg_code", "discharges"),
    ("facilities", "facility_id", "phone"),
    ("facilities", "facility_id", "ownership"),
])
def test_clean_fds_hold(tasks, name, lhs, rhs):
    t = tasks[name]
    groups = t.clean.groupby(lhs)[rhs].nunique()
    assert (groups == 1).all(), f"FD {lhs}->{rhs} violated in clean {name}"


@pytest.mark.parametrize("name", DATASETS)
def test_value_duplication_exists(tasks, name):
    """Repairs must exist in the observed domain: every non-quasi-key
    attribute should have values appearing multiple times."""
    t = tasks[name]
    quasi_keys = {"id", "beer_name", "tid"}
    dup_attrs = [a for a in t.attrs if a not in quasi_keys]
    medians = [t.clean[a].value_counts().median() for a in dup_attrs]
    assert np.median(medians) >= 2


@pytest.mark.parametrize("name", DATASETS)
def test_noise_rate_close_to_paper(tasks, name):
    t = tasks[name]
    rate = PAPER_TABLE2[name][3]
    attrs = t.attrs
    n_cells = len(t.dirty) * len(attrs)
    errs = (t.dirty[attrs].fillna("") != t.clean[attrs].fillna("")).sum().sum()
    # S-type swaps mark two cells per injection, so allow headroom
    assert rate * 0.5 * n_cells <= errs <= rate * 2.2 * n_cells


@pytest.mark.parametrize("name", DATASETS)
def test_error_log_is_exact(tasks, name):
    t = tasks[name]
    diff = (t.dirty.set_index("tid")[t.attrs].fillna("")
            != t.clean.set_index("tid")[t.attrs].fillna(""))
    from_log = set(zip(t.errors["tid"], t.errors["attr"]))
    from_diff = set()
    st = diff.stack()
    for (tid, a), bad in st.items():
        if bad:
            from_diff.add((tid, a))
    assert from_log == from_diff


@pytest.mark.parametrize("name", DATASETS)
def test_error_types_match_request(tasks, name):
    t = tasks[name]
    assert set(t.errors["type"]) <= set(t.error_types)


def test_load_task_overrides():
    t = load_task("hospital", scale=0.1, noise_rate=0.2,
                  error_types=("T",), seed=9)
    assert set(t.errors["type"]) == {"T"}
    assert t.noise_rate == 0.2


def test_load_task_unknown():
    with pytest.raises(KeyError):
        load_task("nope")


def test_soccer_team_consistency():
    pdf = soccer(500, seed=2)
    # team attributes are consistent (FD team -> city/stadium/manager)
    assert (pdf.groupby("team")[["city", "stadium", "manager"]]
            .nunique() == 1).all().all()


def test_hospital_stateavg_formula():
    pdf = hospital(200, seed=4)
    expect = pdf["State"] + "_" + pdf["MeasureCode"] + "_avg"
    assert (pdf["StateAvg"] == expect).all()


def test_flights_clock_format():
    import re
    pdf = flights(100, seed=3)
    rx = re.compile(r"(1[0-2]|[1-9]):[0-5][0-9] [ap]\.m\.")
    for col in ["sched_dep_time", "act_dep_time"]:
        assert pdf[col].map(lambda v: bool(rx.fullmatch(v))).all()


def test_beers_unique_brewery_names():
    pdf = beers(400, seed=1)
    per_id = pdf.groupby("brewery_name")["brewery_id"].nunique()
    assert (per_id == 1).all()


def test_inpatient_and_facilities_sizes():
    assert len(inpatient(300, seed=0)) == 300
    assert len(facilities(300, seed=0)) == 300


def test_subsample_task():
    from repro.datasets.registry import subsample_task
    t = load_task("hospital", scale=0.2, seed=4)
    sub = subsample_task(t, 0.25, seed=1)
    assert len(sub.dirty) == int(0.25 * len(t.dirty))
    assert set(sub.dirty["tid"]) <= set(t.dirty["tid"])
    # error log restricted to surviving rows, and still exact
    assert set(sub.errors["tid"]) <= set(sub.dirty["tid"])
    diff = (sub.dirty.set_index("tid")[sub.attrs]
            != sub.clean.set_index("tid")[sub.attrs]).sum().sum()
    assert diff == len(sub.errors)


def test_subsample_thins_duplication():
    from repro.datasets.registry import subsample_task
    t = load_task("soccer", scale=0.05, seed=4)
    sub = subsample_task(t, 0.25, seed=1)
    full_dup = t.clean["name"].value_counts().mean()
    sub_dup = sub.clean["name"].value_counts().mean()
    assert sub_dup < full_dup  # the point of the Table-5 experiment

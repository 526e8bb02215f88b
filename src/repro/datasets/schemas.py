"""Clean-table generators for the seven evaluation datasets (paper Table II).

The public dirty datasets (Hospital, Flights, Beers, Rayyan, Billionaire,
Movies, Tax) are not available offline, so each generator synthesizes a
*clean* table with the same schema shape: attribute kinds, value formats,
categorical domains, and — crucially for rule-violation errors — real
functional dependencies across attributes. Errors are injected afterwards
by :mod:`repro.errors.inject` at Table II rates.

Every generator is deterministic in ``(n, seed)`` and returns
``(clean_pandas_df_of_strings, metadata)`` where metadata carries the FDs,
regex patterns, knowledge base, and numeric attributes that the baselines
(NADEEF, Katara, dBoost) receive as their published inputs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.datasets.base import stringify

# ---------------------------------------------------------------- vocabularies

_CITIES = [
    "birmingham", "dothan", "florence", "gadsden", "huntsville", "mobile",
    "montgomery", "opelika", "selma", "tuscaloosa", "athens", "boaz",
    "cullman", "decatur", "eufaula", "fairhope", "hamilton", "jasper",
    "oneonta", "sheffield",
]
_STATES = ["al", "ak", "az", "ca", "co", "fl", "ga", "il", "ny", "tx"]
_FIRST = [
    "james", "mary", "john", "linda", "robert", "patricia", "michael",
    "barbara", "william", "susan", "david", "jessica", "richard", "sarah",
    "joseph", "karen", "thomas", "nancy", "charles", "lisa",
]
_LAST = [
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller",
    "davis", "rodriguez", "martinez", "wilson", "anderson", "taylor",
    "thomas", "moore", "jackson", "martin", "lee", "perez", "white",
]
_WORDS = [
    "golden", "river", "stone", "amber", "cedar", "summit", "harbor",
    "silver", "maple", "canyon", "aurora", "ember", "willow", "granite",
    "meadow", "falcon", "cobalt", "juniper", "onyx", "prairie",
]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _pick(g: np.random.Generator, vocab: list[str], n: int) -> np.ndarray:
    return g.choice(np.array(vocab, dtype=object), n)


def _fd_map(g: np.random.Generator, keys: list[str], values: list[str]) -> dict[str, str]:
    """A deterministic functional mapping key -> value (values may repeat)."""
    vals = g.choice(np.array(values, dtype=object), len(keys))
    return dict(zip(keys, vals))


def _with_tail(
    g: np.random.Generator, values, rare: list[str], p: float = 0.012
) -> np.ndarray:
    """Replace a small fraction of ``values`` with rare-but-VALID variants.

    Real datasets contain legitimate rare values (an uncommon city, a 100 %
    score, a 32 oz can); frequency-based detectors mistake them for errors.
    Without this tail the synthetic data is "too clean" and rare-value
    heuristics (dBoost) score unrealistically perfect precision.
    """
    out = np.array(values, dtype=object)
    hit = g.random(len(out)) < p
    if hit.any():
        out[hit] = g.choice(np.array(rare, dtype=object), int(hit.sum()))
    return out


# ------------------------------------------------------------------- hospital


def hospital(n: int, seed: int = 0):
    g = _rng(seed + 11)
    city_state = _fd_map(g, _CITIES, _STATES)
    city_county = {c: f"{c} county" for c in _CITIES}
    city_zip = {c: f"{35000 + i * 37}" for i, c in enumerate(_CITIES)}
    codes = [f"{p}-{i}" for p in ("SCIP", "AMI", "PN", "HF") for i in range(1, 6)]
    code_cond = {
        "SCIP": "surgical infection prevention", "AMI": "heart attack",
        "PN": "pneumonia", "HF": "heart failure",
    }
    code_name = {
        c: f"{code_cond[c.split('-')[0]]} measure {c.split('-')[1]}" for c in codes
    }
    city = _pick(g, _CITIES, n)
    code = _pick(g, codes, n)
    pdf = pd.DataFrame(
        {
            "provider_number": [f"{10001 + int(x)}" for x in g.integers(0, 400, n)],
            "hospital_name": [f"{c} medical center" for c in city],
            "city": city,
            "state": [city_state[c] for c in city],
            "zip_code": [city_zip[c] for c in city],
            "county": [city_county[c] for c in city],
            "phone": [
                f"{a}-{b:03d}-{c:04d}"
                for a, b, c in zip(
                    g.choice([205, 256, 334], n), g.integers(0, 1000, n), g.integers(0, 10000, n)
                )
            ],
            "condition": [code_cond[c.split("-")[0]] for c in code],
            "measure_code": code,
            "measure_name": [code_name[c] for c in code],
            "score": _with_tail(
                g, [f"{int(x)}%" for x in g.integers(40, 100, n)], ["100%", "9%"]
            ),
            "sample": _with_tail(
                g, [f"{int(x)}" for x in g.integers(10, 900, n)], ["1024", "7"]
            ),
        }
    )
    meta = {
        "fds": [
            ("city", "state"), ("city", "county"), ("zip_code", "city"),
            ("measure_code", "measure_name"), ("measure_code", "condition"),
        ],
        "patterns": {
            "provider_number": r"^\d{5}$", "zip_code": r"^\d{5}$",
            "phone": r"^\d{3}-\d{3}-\d{4}$", "score": r"^\d{1,3}%$",
            "sample": r"^\d+$", "measure_code": r"^[A-Z]+-\d+$",
        },
        "kb": {
            ("city", "state"): dict(city_state),
            ("measure_code", "condition"): {
                c: code_cond[c.split("-")[0]] for c in codes[: len(codes) // 2]
            },
        },
        "numeric_attrs": ["sample"],
        "nadeef_attrs": ["phone", "zip_code"],
    }
    return stringify(pdf), meta


# -------------------------------------------------------------------- flights


def flights(n: int, seed: int = 0):
    g = _rng(seed + 22)
    airlines = ["AA", "UA", "DL", "WN", "B6", "AS"]
    airports = ["ABQ", "PHX", "LAX", "JFK", "ORD", "DFW", "SEA", "ATL", "DEN", "MIA"]
    n_flights = max(20, n // 12)

    def _time(h, m):
        ampm = "a.m." if h < 12 else "p.m."
        hh = h % 12 or 12
        return f"{hh}:{m:02d} {ampm}"

    fl_ids, fl_dep, fl_arr, fl_gate = [], {}, {}, {}
    for i in range(n_flights):
        a = airlines[int(g.integers(0, len(airlines)))]
        o, d = g.choice(np.array(airports, dtype=object), 2, replace=False)
        fid = f"{a}-{1000 + i}-{o}-{d}"
        fl_ids.append(fid)
        dep_h, dep_m = int(g.integers(5, 23)), int(g.integers(0, 12)) * 5
        dur = int(g.integers(60, 300))
        arr = (dep_h * 60 + dep_m + dur) % (24 * 60)
        fl_dep[fid] = _time(dep_h, dep_m)
        fl_arr[fid] = _time(arr // 60, arr % 60)
        fl_gate[fid] = f"{'ABCDE'[int(g.integers(0, 5))]}{int(g.integers(1, 30))}"
    flight = g.choice(np.array(fl_ids, dtype=object), n)
    sources = ["aa", "flightview", "flightaware", "orbitz", "travelocity", "mytrips"]
    rare_sources = ["airtravelcenter", "quicktrip"]

    def _shift(t: str, g: np.random.Generator) -> str:
        # actual time = scheduled +0/5/10 minutes, same rendering
        hh_mm, ampm = t.rsplit(" ", 1)
        h, m = map(int, hh_mm.split(":"))
        h24 = (h % 12) + (12 if ampm == "p.m." else 0)
        total = (h24 * 60 + m + int(g.choice([0, 5, 10]))) % (24 * 60)
        return _time(total // 60, total % 60)

    pdf = pd.DataFrame(
        {
            "src": _with_tail(g, _pick(g, sources, n), rare_sources),
            "flight": flight,
            "sched_dep_time": [fl_dep[f] for f in flight],
            "act_dep_time": [_shift(fl_dep[f], g) for f in flight],
            "sched_arr_time": [fl_arr[f] for f in flight],
            "act_arr_time": [_shift(fl_arr[f], g) for f in flight],
            "dep_gate": [fl_gate[f] for f in flight],
        }
    )
    time_re = r"^\d{1,2}:\d{2} [ap]\.m\.$"
    meta = {
        "fds": [
            ("flight", "sched_dep_time"), ("flight", "sched_arr_time"),
            ("flight", "dep_gate"),
        ],
        "patterns": {
            "flight": r"^[A-Z0-9]{2}-\d+-[A-Z]{3}-[A-Z]{3}$",
            "sched_dep_time": time_re, "act_dep_time": time_re,
            "sched_arr_time": time_re, "act_arr_time": time_re,
            "dep_gate": r"^[A-E]\d{1,2}$",
        },
        "kb": {},
        "numeric_attrs": [],
        "nadeef_attrs": ["sched_dep_time", "act_dep_time", "sched_arr_time", "act_arr_time", "flight", "dep_gate"],
    }
    return stringify(pdf), meta


# ---------------------------------------------------------------------- beers


def beers(n: int, seed: int = 0):
    g = _rng(seed + 33)
    styles = [
        "american ipa", "american pale ale", "american porter", "american stout",
        "witbier", "hefeweizen", "saison", "pilsner", "amber ale", "brown ale",
        "cream ale", "fruit beer", "golden ale", "kolsch", "oatmeal stout",
    ]
    n_brew = max(10, n // 40)
    brew_ids = [f"{100 + i}" for i in range(n_brew)]
    brew_name = {
        b: f"{_WORDS[i % len(_WORDS)]} {['brewing co', 'brewery', 'beer works'][i % 3]}"
        for i, b in enumerate(brew_ids)
    }
    brew_city = _fd_map(g, brew_ids, _CITIES)
    city_state = _fd_map(g, _CITIES, _STATES)
    bid = _pick(g, brew_ids, n)
    pdf = pd.DataFrame(
        {
            "id": [f"{2000 + i}" for i in range(n)],
            "beer_name": [
                f"{w1} {w2}" for w1, w2 in zip(_pick(g, _WORDS, n), _pick(g, ["ipa", "lager", "ale", "stout", "porter"], n))
            ],
            "style": _with_tail(g, _pick(g, styles, n), ["gose", "berliner weisse"]),
            "ounces": _with_tail(g, _pick(g, ["12.0", "16.0", "8.4", "19.2"], n), ["32.0", "24.0"]),
            "abv": [f"{x:.3f}" for x in g.uniform(0.03, 0.11, n)],
            "ibu": [f"{int(x)}" for x in g.integers(5, 120, n)],
            "brewery_id": bid,
            "brewery_name": [brew_name[b] for b in bid],
            "city": [brew_city[b] for b in bid],
            "state": [city_state[brew_city[b]] for b in bid],
        }
    )
    meta = {
        "fds": [
            ("brewery_id", "brewery_name"), ("brewery_id", "city"),
            ("brewery_id", "state"), ("city", "state"),
        ],
        "patterns": {
            "id": r"^\d+$", "ounces": r"^\d{1,2}\.\d$", "abv": r"^0\.\d{2,3}$",
            "ibu": r"^\d+$", "brewery_id": r"^\d+$",
        },
        "kb": {},
        "numeric_attrs": ["ounces", "abv", "ibu"],
        "nadeef_attrs": ["abv"],
    }
    return stringify(pdf), meta


# --------------------------------------------------------------------- rayyan


def rayyan(n: int, seed: int = 0):
    g = _rng(seed + 44)
    journals = [f"journal of {w} studies" for w in _WORDS[:12]] + [
        f"{w} medical review" for w in _WORDS[12:18]
    ]
    j_abbrev = {j: "j. " + ". ".join(p[0] for p in j.split()[1:]) for j in journals}
    j_issn = {
        j: f"{int(g.integers(1000, 9999)):04d}-{int(g.integers(1000, 9999)):04d}"
        for j in journals
    }
    j_country = _fd_map(g, journals, ["usa", "uk", "germany", "france", "japan", "china"])
    jr = _pick(g, journals, n)
    p0 = g.integers(1, 900, n)
    pdf = pd.DataFrame(
        {
            "article_id": [f"{5_000_000 + i}" for i in range(n)],
            "title": [
                f"{a} {b} in {c} systems"
                for a, b, c in zip(_pick(g, _WORDS, n), _pick(g, ["analysis", "detection", "methods", "outcomes"], n), _pick(g, _WORDS, n))
            ],
            "journal_title": jr,
            "journal_abbrev": [j_abbrev[j] for j in jr],
            "journal_issn": [j_issn[j] for j in jr],
            "year": [f"{int(x)}" for x in g.integers(1985, 2016, n)],
            "pagination": [f"{int(a)}-{int(a) + int(b)}" for a, b in zip(p0, g.integers(5, 30, n))],
            "language": _with_tail(
                g, _pick(g, ["eng", "fre", "ger", "spa", "chi", "jpn"], n), ["dut", "rus"]
            ),
            "journal_country": [j_country[j] for j in jr],
            "author_count": [f"{int(x)}" for x in g.integers(1, 12, n)],
        }
    )
    meta = {
        "fds": [
            ("journal_title", "journal_abbrev"), ("journal_title", "journal_issn"),
            ("journal_title", "journal_country"),
        ],
        "patterns": {
            "article_id": r"^\d+$", "journal_issn": r"^\d{4}-\d{4}$",
            "year": r"^(19|20)\d{2}$", "pagination": r"^\d+-\d+$",
            "author_count": r"^\d+$", "language": r"^[a-z]{3}$",
        },
        "kb": {},
        "numeric_attrs": ["year", "author_count"],
        "nadeef_attrs": ["journal_issn", "year", "pagination"],
    }
    return stringify(pdf), meta


# ---------------------------------------------------------------- billionaire


def billionaire(n: int, seed: int = 0):
    g = _rng(seed + 55)
    countries = [
        "united states", "china", "germany", "russia", "india", "brazil",
        "united kingdom", "france", "italy", "japan", "canada", "australia",
        "mexico", "spain", "sweden", "switzerland",
    ]
    regions = {
        "united states": "north america", "canada": "north america",
        "mexico": "north america", "brazil": "south america",
        "china": "east asia", "japan": "east asia", "india": "south asia",
        "germany": "europe", "russia": "europe", "united kingdom": "europe",
        "france": "europe", "italy": "europe", "spain": "europe",
        "sweden": "europe", "switzerland": "europe", "australia": "oceania",
    }
    sectors = ["technology", "retail", "energy", "finance", "media", "real estate", "healthcare"]
    companies = [f"{w} {s}" for w, s in zip(_WORDS, ["corp", "group", "holdings", "inc"] * 5)]
    comp_sector = _fd_map(g, companies, sectors)
    first = _pick(g, _FIRST, n)
    first_gender = {f: ("male" if i % 2 == 0 else "female") for i, f in enumerate(_FIRST)}
    comp = _pick(g, companies, n)
    ctry = _pick(g, countries, n)
    pdf = pd.DataFrame(
        {
            "name": [f"{a} {b}" for a, b in zip(first, _pick(g, _LAST, n))],
            "rank": [f"{i + 1}" for i in range(n)],
            "year": _pick(g, ["1996", "2001", "2014"], n),
            "company": comp,
            "sector": [comp_sector[c] for c in comp],
            "worth_billions": _with_tail(
                g, [f"{x:.1f}" for x in g.uniform(1.0, 40.0, n)], ["103.4", "96.7"], p=0.008
            ),
            "position": _pick(g, ["founder", "chairman", "ceo", "investor", "heir"], n),
            "age": [f"{int(x)}" for x in g.integers(30, 95, n)],
            "gender": [first_gender[f] for f in first],
            "country": ctry,
            "region": [regions[c] for c in ctry],
            "industry": [comp_sector[c] for c in comp],
        }
    )
    meta = {
        "fds": [("company", "sector"), ("country", "region"), ("company", "industry")],
        "patterns": {
            "rank": r"^\d+$", "year": r"^(19|20)\d{2}$",
            "worth_billions": r"^\d{1,3}\.\d$", "age": r"^\d{2}$",
        },
        "kb": {("country", "region"): dict(regions)},
        "numeric_attrs": ["rank", "year", "worth_billions", "age"],
        "nadeef_attrs": ["worth_billions"],
    }
    return stringify(pdf), meta


# --------------------------------------------------------------------- movies


def movies(n: int, seed: int = 0):
    g = _rng(seed + 66)
    months = [
        "january", "february", "march", "april", "may", "june", "july",
        "august", "september", "october", "november", "december",
    ]
    genres = ["drama", "comedy", "action", "thriller", "romance", "horror", "documentary"]
    years = g.integers(1960, 2015, n)
    pdf = pd.DataFrame(
        {
            "id": [f"tt{1000000 + i}" for i in range(n)],
            "name": [
                f"the {a} {b}" for a, b in zip(_pick(g, _WORDS, n), _pick(g, ["affair", "road", "garden", "secret", "return"], n))
            ],
            "year": [f"{int(y)}" for y in years],
            "release_date": [
                f"{int(d)} {months[int(m)]} {int(y)}"
                for d, m, y in zip(g.integers(1, 29, n), g.integers(0, 12, n), years)
            ],
            "director": [f"{a} {b}" for a, b in zip(_pick(g, _FIRST, n), _pick(g, _LAST, n))],
            "creator": [f"{a} {b}" for a, b in zip(_pick(g, _FIRST, n), _pick(g, _LAST, n))],
            "cast": [
                f"{a} {b}, {c} {d}"
                for a, b, c, d in zip(_pick(g, _FIRST, n), _pick(g, _LAST, n), _pick(g, _FIRST, n), _pick(g, _LAST, n))
            ],
            "duration": [f"{int(x)} min" for x in g.integers(75, 200, n)],
            "rating_value": _with_tail(
                g, [f"{x:.1f}" for x in g.uniform(3.0, 9.5, n)], ["10.0"], p=0.006
            ),
            "rating_count": [f"{int(x)}" for x in g.integers(100, 300000, n)],
            "genre": _pick(g, genres, n),
            "language": _pick(g, ["english", "french", "spanish", "german", "hindi"], n),
        }
    )
    meta = {
        "fds": [],  # Table II reports RV = 0 for Movies
        "patterns": {
            "id": r"^tt\d{7}$", "year": r"^(19|20)\d{2}$",
            "release_date": r"^\d{1,2} [a-z]+ (19|20)\d{2}$",
            "duration": r"^\d{2,3} min$", "rating_value": r"^\d\.\d$",
            "rating_count": r"^\d+$",
        },
        "kb": {},
        "numeric_attrs": ["year", "rating_value", "rating_count"],
        "nadeef_attrs": ["id"],
    }
    return stringify(pdf), meta


# ------------------------------------------------------------------------ tax


def tax(n: int, seed: int = 0):
    g = _rng(seed + 77)
    city_state = _fd_map(g, _CITIES, _STATES)
    city_zip = {c: f"{60000 + i * 91}" for i, c in enumerate(_CITIES)}
    state_rate = {s: f"{r:.2f}" for s, r in zip(_STATES, np.linspace(2.0, 9.5, len(_STATES)))}
    city = _pick(g, _CITIES, n)
    first = _pick(g, _FIRST, n)
    first_gender = {f: ("m" if i % 2 == 0 else "f") for i, f in enumerate(_FIRST)}
    marital = _pick(g, ["s", "m"], n)
    pdf = pd.DataFrame(
        {
            "f_name": first,
            "l_name": _pick(g, _LAST, n),
            "gender": [first_gender[f] for f in first],
            "area_code": _pick(g, ["205", "256", "334", "938"], n),
            "phone": [f"{int(a):03d}-{int(b):04d}" for a, b in zip(g.integers(0, 1000, n), g.integers(0, 10000, n))],
            "city": city,
            "state": [city_state[c] for c in city],
            "zip": [city_zip[c] for c in city],
            "marital_status": marital,
            "has_child": _pick(g, ["y", "n"], n),
            "salary": [f"{int(x)}" for x in g.integers(10000, 150000, n)],
            "rate": [state_rate[city_state[c]] for c in city],
            "single_exemp": [f"{0 if m == 'm' else int(x)}" for m, x in zip(marital, g.integers(500, 4000, n))],
            "child_exemp": [f"{int(x)}" for x in g.integers(0, 2000, n)],
        }
    )
    meta = {
        "fds": [("city", "state"), ("city", "zip"), ("state", "rate")],
        "patterns": {
            "phone": r"^\d{3}-\d{4}$", "zip": r"^\d{5}$", "area_code": r"^\d{3}$",
            "salary": r"^\d+$", "rate": r"^\d\.\d{2}$",
            "gender": r"^[mf]$", "marital_status": r"^[sm]$", "has_child": r"^[yn]$",
        },
        "kb": {},
        "numeric_attrs": ["salary", "rate", "single_exemp", "child_exemp"],
        "nadeef_attrs": ["zip", "rate"],
    }
    return stringify(pdf), meta


GENERATORS = {
    "hospital": hospital,
    "flights": flights,
    "beers": beers,
    "rayyan": rayyan,
    "billionaire": billionaire,
    "movies": movies,
    "tax": tax,
}

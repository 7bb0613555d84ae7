"""Entity registries — the shared value pools behind the synthetic corpora.

The paper's corpora (Dresden Web Tables, German Open Data, School) are
collections of tables about overlapping real-world entities: the same
person/city/school appears in many tables, which is what makes n-ary
joins possible and, crucially, what produces the paper's false-positive
regime (many rows share a *first name*, few share the full
<first, last, country> key).

Each registry is a deterministic pandas DataFrame of correlated entity
attributes. Corpus generators sample rows from a registry, so value
combinations recur across tables exactly like entities recur across web
tables. All attribute values are strings (web-table cells are text).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

FIRST_NAMES = [
    "muhammad", "ansel", "helmut", "gretchen", "adam", "maria", "james",
    "wei", "fatima", "carlos", "yuki", "olga", "pierre", "amara", "lars",
    "sofia", "david", "chen", "aisha", "marco", "ingrid", "omar", "elena",
    "henrik", "priya", "jack", "lena", "diego", "nora", "felix", "ida",
    "ravi", "mona", "otto", "zara", "sven", "lucia", "emil", "rosa", "karl",
]
LAST_NAMES = [
    "lee", "adams", "newton", "sandler", "ali", "schmidt", "garcia", "wang",
    "kim", "mueller", "rossi", "tanaka", "novak", "silva", "jensen", "petrov",
    "dubois", "hansen", "costa", "moreau", "weber", "ricci", "yamamoto",
    "larsen", "fischer", "romano", "berg", "keller", "vogel", "lund",
    "haas", "marino", "holm", "brandt", "ferrari", "krause", "dahl",
    "conti", "frank", "meyer", "beck", "stein", "falk", "ott", "ruiz",
    "mora", "pham", "diaz", "roy", "shah", "khan", "das", "lam", "nagy",
    "toth", "horvat", "papp", "vas", "biro", "orban",
]
# country -> its cities (correlated attributes, as in real tables).
GEOGRAPHY = {
    "germany": ["berlin", "hamburg", "munich", "dresden", "hannover", "cologne"],
    "us": ["new york", "chicago", "boston", "seattle", "austin", "denver"],
    "uk": ["london", "leeds", "bristol", "york", "bath", "hull"],
    "france": ["paris", "lyon", "nice", "lille", "nantes"],
    "italy": ["rome", "milan", "turin", "naples", "bari"],
    "spain": ["madrid", "seville", "valencia", "bilbao"],
    "japan": ["tokyo", "osaka", "kyoto", "nagoya"],
    "india": ["mumbai", "delhi", "pune", "chennai"],
    "brazil": ["rio", "sao paulo", "recife"],
    "canada": ["toronto", "montreal", "calgary"],
    "poland": ["warsaw", "krakow", "gdansk"],
    "sweden": ["stockholm", "malmo", "uppsala"],
    "norway": ["oslo", "bergen"],
    "denmark": ["copenhagen", "aarhus"],
    "austria": ["vienna", "graz"],
    "mexico": ["mexico city", "monterrey"],
    "china": ["beijing", "shanghai", "shenzhen"],
    "korea": ["seoul", "busan"],
    "egypt": ["cairo", "giza"],
    "kenya": ["nairobi", "mombasa"],
}
COUNTRIES = list(GEOGRAPHY)
CITIES = [c for cs in GEOGRAPHY.values() for c in cs]
OCCUPATIONS = [
    "photographer", "dancer", "boxer", "birder", "artist", "actor", "teacher",
    "engineer", "nurse", "chef", "pilot", "writer", "farmer", "judge",
    "singer", "tailor", "miner", "clerk", "guide", "broker", "baker",
    "driver", "coach", "medic", "scout",
]
COMPANIES = [
    f"{w} {s}"
    for w in ["alpha", "nord", "delta", "orion", "vega", "atlas", "terra", "lumen"]
    for s in ["labs", "group", "works", "media", "goods"]
]
GENRES = ["drama", "comedy", "action", "horror", "romance", "sci fi", "noir", "western"]
STUDIOS = ["silverlight", "moonstone", "redwood", "harbor", "paramount hill", "northgate"]
AIRLINE_WORDS = ["air", "wings", "sky", "jet", "fly", "trans"]
PROGRAM_TYPES = [
    "magnet", "charter", "vocational", "montessori", "bilingual", "stem",
    "arts", "gifted", "special ed", "online", "evening", "standard",
]
SCHOOL_KINDS = ["elementary", "middle", "high", "technical", "academy"]
POLLUTANTS = ["pm10", "pm25", "no2", "o3", "so2", "co"]
AGENCIES = ["uba", "eea", "lanuv", "lfu", "stadt", "land"]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def person_registry(n: int = 3000, seed: int = 100) -> pd.DataFrame:
    """People with correlated country/city; the web-table backbone."""
    g = _rng(seed)
    country = g.choice(COUNTRIES, n)
    city = np.array([GEOGRAPHY[c][g.integers(len(GEOGRAPHY[c]))] for c in country])
    return pd.DataFrame(
        {
            "first name": g.choice(FIRST_NAMES, n),
            "last name": g.choice(LAST_NAMES, n),
            "country": country,
            "city": city,
            "occupation": g.choice(OCCUPATIONS, n),
            "company": g.choice(COMPANIES, n),
            "birth year": g.integers(1930, 2005, n).astype(str),
        }
    )


def movie_registry(n: int = 900, seed: int = 101) -> pd.DataFrame:
    """Movies; director names reuse the person name pools (as on the web)."""
    g = _rng(seed)
    nouns = ["night", "river", "garden", "mirror", "empire", "signal", "harbor",
             "winter", "echo", "crown", "shadow", "meadow", "comet", "island"]
    adjs = ["silent", "broken", "golden", "lost", "final", "hidden", "distant",
            "burning", "pale", "iron", "wild", "quiet"]
    titles = np.array(
        [f"the {a} {b}" for a in adjs for b in nouns]
        + [f"{a} {b}" for a in nouns for b in nouns if a != b]
    )
    directors = np.array(
        [f"{f} {l}" for f, l in zip(
            _rng(seed + 1).choice(FIRST_NAMES, 300),
            _rng(seed + 2).choice(LAST_NAMES, 300),
        )]
    )
    return pd.DataFrame(
        {
            "movie title": g.choice(titles, n, replace=True),
            "director name": g.choice(directors, n),
            "country": g.choice(COUNTRIES, n),
            "release year": g.integers(1950, 2022, n).astype(str),
            "genre": g.choice(GENRES, n),
            "studio": g.choice(STUDIOS, n),
        }
    )


def airline_registry(n: int = 400, seed: int = 102) -> pd.DataFrame:
    """Airlines and the airports/countries they operate in."""
    g = _rng(seed)
    names = np.array(
        [f"{w} {c}" for w in AIRLINE_WORDS for c in COUNTRIES]
    )
    country = g.choice(COUNTRIES, n)
    airport = np.array(
        [f"{GEOGRAPHY[c][g.integers(len(GEOGRAPHY[c]))]} intl" for c in country]
    )
    return pd.DataFrame(
        {
            "airline name": g.choice(names, n),
            "country": country,
            "airport": airport,
            "fleet size": g.integers(3, 250, n).astype(str),
        }
    )


def school_registry(n: int = 500, seed: int = 103) -> pd.DataFrame:
    """Schools; the School-corpus backbone (wide tables, Section 7.1)."""
    g = _rng(seed)
    city = g.choice(CITIES, n)
    kind = g.choice(SCHOOL_KINDS, n)
    number = g.integers(1, 40, n)
    return pd.DataFrame(
        {
            "school name": [f"{c} {k} school {i}" for c, k, i in zip(city, kind, number)],
            "program type": g.choice(PROGRAM_TYPES, n),
            "city": city,
            "district": [f"district {d}" for d in g.integers(1, 30, n)],
            "grade band": g.choice(["k 5", "6 8", "9 12", "k 8", "k 12"], n),
            "enrollment": g.integers(80, 3500, n).astype(str),
        }
    )


def station_registry(n: int = 260, seed: int = 104) -> pd.DataFrame:
    """Air-quality stations; the open-data backbone (pollution use case)."""
    g = _rng(seed)
    city = g.choice(CITIES, n)
    return pd.DataFrame(
        {
            "station id": [f"st {i:04d}" for i in g.integers(0, 500, n)],
            "city": city,
            "pollutant": g.choice(POLLUTANTS, n),
            "unit": g.choice(["ug m3", "ppb", "mg m3"], n),
            "agency": g.choice(AGENCIES, n),
        }
    )


def date_pool(n: int = 240, seed: int = 105) -> np.ndarray:
    """Shared ISO-date strings so timestamp columns join across tables."""
    g = _rng(seed)
    base = np.datetime64("2018-01-01")
    return np.array(
        [str(base + np.timedelta64(int(d), "D")) for d in g.integers(0, 730, n)]
    )

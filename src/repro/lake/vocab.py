"""Domain vocabulary pools backing the synthetic data lake and WEM.

The paper's corpora are UK open-government tables (GP practices, schools,
businesses, transport, health...). We reproduce the *vocabulary structure*
those corpora have: entity names drawn from shared pools (so tables from
different sources overlap on cities, postcodes, street names, organisation
names), with frequent "type" words (street/road/clinic/school/...) that the
paper's Example 2 relies on for the frequent/infrequent token split.

Every generator here is deterministic in its ``rng``.
"""
from __future__ import annotations

import numpy as np

# ---------------------------------------------------------------------------
# Word pools. Keys double as WEM semantic domains (repro.embedding.wem).
# ---------------------------------------------------------------------------

CITIES = [
    "Manchester", "Salford", "Bolton", "Bury", "Oldham", "Rochdale", "Stockport",
    "Wigan", "Leeds", "Bradford", "Sheffield", "Liverpool", "Preston", "Blackburn",
    "Burnley", "Lancaster", "York", "Hull", "Derby", "Nottingham", "Leicester",
    "Birmingham", "Coventry", "Bristol", "Exeter", "Plymouth", "Norwich", "Ipswich",
    "Cambridge", "Oxford", "Reading", "Luton", "Southampton", "Portsmouth",
    "Brighton", "Croydon", "Belfast", "Cardiff", "Swansea", "Newport", "Glasgow",
    "Edinburgh", "Dundee", "Aberdeen", "Carlisle", "Durham", "Sunderland",
    "Newcastle", "Middlesbrough", "Gateshead",
]

STREET_NAMES = [
    "Oxford", "Portland", "Mirabel", "Church", "Rupert", "Chapel", "Botanic",
    "Victoria", "Albert", "Station", "Market", "Mill", "Bridge", "Castle",
    "Queen", "King", "Park", "Spring", "Grove", "Cedar", "Elm", "Maple",
    "Windsor", "Richmond", "Clarence", "Derby", "Stanley", "Nelson", "Wellington",
    "Hanover", "Brunswick", "Cromwell", "Milton", "Byron", "Chaucer", "Tennyson",
]

STREET_SUFFIXES = ["Street", "Road", "Avenue", "Lane", "Close", "Way", "Drive", "Grove", "Place", "Court"]

#: Abbreviations used by the dirtiness model (Smaller-Real-style noise).
STREET_SUFFIX_ABBREV = {
    "Street": "St", "Road": "Rd", "Avenue": "Av", "Lane": "Ln", "Close": "Cl",
    "Way": "Way", "Drive": "Dr", "Grove": "Gr", "Place": "Pl", "Court": "Ct",
}

SURNAMES = [
    "Cullen", "Smith", "Patel", "Jones", "Williams", "Taylor", "Brown", "Davies",
    "Evans", "Wilson", "Thomas", "Roberts", "Johnson", "Lewis", "Walker", "Hall",
    "Wood", "Clarke", "Hughes", "Green", "Harris", "Baker", "Wright", "Turner",
    "Hill", "Cooper", "Ward", "Morris", "Moore", "Clark", "Lee", "King", "Allen",
    "Scott", "Young", "Shah", "Khan", "Begum", "Ali", "Ahmed", "Murphy", "Kelly",
]

PRACTICE_WORDS = ["Medical", "Practice", "Surgery", "Clinic", "Health", "Centre", "Care", "Family"]
SCHOOL_WORDS = ["Primary", "School", "Academy", "High", "College", "Grammar", "Community"]
HOSPITAL_WORDS = ["Hospital", "Infirmary", "General", "Royal", "University", "Trust"]
COMPANY_WORDS = ["Ltd", "Holdings", "Group", "Services", "Solutions", "Trading", "Industries", "Consulting"]

SECTORS = [
    "retail", "manufacturing", "construction", "logistics", "hospitality",
    "finance", "education", "healthcare", "agriculture", "technology", "energy",
    "transport", "media", "tourism", "property",
]

CRIME_TYPES = [
    "burglary", "robbery", "shoplifting", "vehicle crime", "criminal damage",
    "drugs", "public order", "violence", "theft", "arson", "fraud",
]

POLLUTANTS = ["NO2", "PM10", "PM25", "SO2", "O3", "CO", "benzene"]

SPECIALTIES = [
    "cardiology", "oncology", "orthopaedics", "paediatrics", "dermatology",
    "neurology", "radiology", "urology", "gastroenterology", "ophthalmology",
]

DEPARTMENTS = [
    "finance", "operations", "marketing", "engineering", "sales", "legal",
    "procurement", "support", "research", "administration",
]

FIRST_NAMES = [
    "James", "Mary", "John", "Sarah", "David", "Emma", "Michael", "Laura",
    "Robert", "Sophie", "Daniel", "Alice", "Thomas", "Hannah", "Joseph", "Ruth",
    "Andrew", "Clare", "Peter", "Helen", "Omar", "Aisha", "Wei", "Priya",
]

#: WEM semantic domains: domain name -> member words (lower-cased at lookup).
DOMAINS: dict[str, list[str]] = {
    "city": CITIES,
    "street_name": STREET_NAMES,
    "street_suffix": STREET_SUFFIXES + list(STREET_SUFFIX_ABBREV.values()),
    "surname": SURNAMES,
    "practice": PRACTICE_WORDS,
    "school": SCHOOL_WORDS,
    "hospital": HOSPITAL_WORDS,
    "company": COMPANY_WORDS,
    "sector": SECTORS,
    "crime": [w for t in CRIME_TYPES for w in t.split()],
    "pollutant": POLLUTANTS,
    "specialty": SPECIALTIES,
    "department": DEPARTMENTS,
    "first_name": FIRST_NAMES,
}

_POSTCODE_AREAS = ["M", "BL", "OL", "SK", "WN", "LS", "S", "L", "B", "BT", "W", "NE", "CF", "EH"]


# ---------------------------------------------------------------------------
# Value generators (all deterministic in rng)
# ---------------------------------------------------------------------------

def postcode(rng: np.random.Generator) -> str:
    """UK-style postcode, e.g. 'M13 9PL'."""
    area = _POSTCODE_AREAS[rng.integers(0, len(_POSTCODE_AREAS))]
    district = int(rng.integers(1, 30))
    unit = "".join(chr(65 + int(c)) for c in rng.integers(0, 26, 2))
    return f"{area}{district} {int(rng.integers(0, 10))}{unit}"


def street(rng: np.random.Generator) -> str:
    """Street address, e.g. '41 Oxford Road'."""
    num = int(rng.integers(1, 200))
    name = STREET_NAMES[rng.integers(0, len(STREET_NAMES))]
    suffix = STREET_SUFFIXES[rng.integers(0, len(STREET_SUFFIXES))]
    return f"{num} {name} {suffix}"


def city(rng: np.random.Generator) -> str:
    return CITIES[rng.integers(0, len(CITIES))]


def practice_name(rng: np.random.Generator) -> str:
    """GP practice name, e.g. 'Cullen Medical Practice' or 'Dr E Cullen'."""
    surname = SURNAMES[rng.integers(0, len(SURNAMES))]
    if rng.random() < 0.3:
        initial = chr(65 + int(rng.integers(0, 26)))
        return f"Dr {initial} {surname}"
    w1, w2 = rng.choice(PRACTICE_WORDS, 2, replace=False)
    return f"{surname} {w1} {w2}"


def school_name(rng: np.random.Generator) -> str:
    name = STREET_NAMES[rng.integers(0, len(STREET_NAMES))]
    w1, w2 = rng.choice(SCHOOL_WORDS, 2, replace=False)
    return f"{name} {w1} {w2}"


def hospital_name(rng: np.random.Generator) -> str:
    c = city(rng)
    w = HOSPITAL_WORDS[rng.integers(0, len(HOSPITAL_WORDS))]
    return f"{c} {w} Hospital" if w != "Hospital" else f"{c} Hospital"


def company_name(rng: np.random.Generator) -> str:
    surname = SURNAMES[rng.integers(0, len(SURNAMES))]
    w = COMPANY_WORDS[rng.integers(0, len(COMPANY_WORDS))]
    return f"{surname} {w}"


def person_name(rng: np.random.Generator) -> str:
    first = FIRST_NAMES[rng.integers(0, len(FIRST_NAMES))]
    last = SURNAMES[rng.integers(0, len(SURNAMES))]
    return f"{first} {last}"


def email(rng: np.random.Generator, owner: str) -> str:
    slug = owner.lower().replace(" ", ".").replace("'", "")
    dom = ["example.org", "mail.co.uk", "nhs.uk", "gov.uk"][rng.integers(0, 4)]
    return f"{slug}@{dom}"


def phone(rng: np.random.Generator) -> str:
    return f"0{int(rng.integers(100, 200))} {int(rng.integers(100, 1000)):03d} {int(rng.integers(0, 10000)):04d}"


def date_str(rng: np.random.Generator) -> str:
    y = int(rng.integers(2015, 2021))
    m = int(rng.integers(1, 13))
    d = int(rng.integers(1, 29))
    return f"{y:04d}-{m:02d}-{d:02d}"


def month_str(rng: np.random.Generator) -> str:
    return f"{int(rng.integers(2015, 2021)):04d}-{int(rng.integers(1, 13)):02d}"

"""Synthetic data lake with recorded ground truth (DESIGN.md row 15).

The paper evaluates on three corpora we cannot download offline:

* *Synthetic* — ~5,000 tables derived from 32 base tables of Canadian open
  data "using random projections and selections on the base tables" (§V),
  with ground truth recorded during derivation (same base => related).
* *Smaller Real* — ~700 dirty UK open-government tables (manual GT).
* *Larger Real* — ~43,000 NHS tables (timing only).

This module reproduces the *Synthetic* derivation procedure over our own
base tables (UK-open-data-style domains, shared vocabulary pools so
cross-source joins exist) and adds a ``noise`` knob that injects the
dirtiness the paper attributes to *Smaller Real*: column renames through a
synonym map, per-column format perturbations (case flips, postcode-space
removal, street-suffix abbreviation, separator rewrites) and null
injection. ``noise=0`` plays the role of *Synthetic*; ``noise~=0.6`` plays
*Smaller Real*; a larger ``derivations_per_base`` plays *Larger Real* for
timing sweeps.

Ground truth is recorded at derivation time at two granularities:

* table-level: two lake tables are related iff derived from the same base
  (identical to the paper's Synthetic GT);
* attribute-level: two attributes are related iff their values are drawn
  from the same domain pool (the paper's Definition 1), which also covers
  cross-base pairs such as two ``city`` columns.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.lake import vocab

# ---------------------------------------------------------------------------
# Base-table schema specs
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class ColumnSpec:
    """One base-table column: its name, value domain, and roles."""

    name: str
    domain: str
    numeric: bool = False
    subject: bool = False


#: Synonyms used for noisy column renames, keyed by base column name.
SYNONYMS: dict[str, list[str]] = {
    "practice_name": ["practice", "gp_practice", "surgery", "provider_name"],
    "practice": ["practice_name", "gp", "provider"],
    "school_name": ["school", "establishment", "institution"],
    "school": ["school_name", "establishment"],
    "hospital": ["hospital_name", "trust", "site"],
    "company": ["company_name", "business", "organisation"],
    "city": ["town", "locality", "area"],
    "town": ["city", "locality"],
    "postcode": ["post_code", "pcode", "postal_code"],
    "address": ["street_address", "addr", "location"],
    "street": ["road", "street_name", "thoroughfare"],
    "patients": ["list_size", "registered_patients"],
    "payment": ["total_payment", "funding", "amount"],
    "pupils": ["number_on_roll", "enrolment"],
    "beds": ["bed_count", "capacity"],
    "employees": ["staff_count", "headcount"],
    "revenue": ["turnover", "annual_revenue"],
    "price": ["sale_price", "amount_paid"],
    "salary": ["pay", "annual_salary"],
    "reading": ["value", "measurement"],
    "contact_email": ["email", "email_address"],
    "phone": ["telephone", "contact_number"],
    "sale_date": ["date_of_transfer", "transaction_date"],
    "reading_date": ["date", "observed_on"],
    "crime_type": ["offence", "crime_category"],
    "station_name": ["station", "monitoring_site"],
    "pass_rate": ["attainment", "pct_passing"],
    "weeks": ["wait_weeks", "waiting_time"],
    "reports": ["incident_count", "occurrences"],
    "month": ["period", "reporting_month"],
}


def _base_specs() -> dict[str, list[ColumnSpec]]:
    """The 12 base tables. Shared ``domain`` strings across bases encode the
    value-pool sharing that makes cross-source union/join discovery
    non-trivial (e.g. every ``city`` column draws from the same pool)."""
    C = ColumnSpec
    return {
        "gp_practices": [
            C("practice_name", "practice_entity", subject=True),
            C("address", "street"),
            C("city", "city"),
            C("postcode", "postcode"),
            C("patients", "patient_count", numeric=True),
        ],
        "gp_funding": [
            C("practice", "practice_entity", subject=True),
            C("city", "city"),
            C("postcode", "postcode"),
            C("payment", "payment_amount", numeric=True),
        ],
        "gp_staff": [
            C("practice", "practice_entity", subject=True),
            C("gps", "staff_count", numeric=True),
            C("nurses", "staff_count", numeric=True),
            C("admin_staff", "staff_count", numeric=True),
        ],
        "schools": [
            C("school_name", "school_entity", subject=True),
            C("street", "street"),
            C("town", "city"),
            C("postcode", "postcode"),
            C("pupils", "pupil_count", numeric=True),
        ],
        "school_results": [
            C("school", "school_entity", subject=True),
            C("town", "city"),
            C("pass_rate", "pass_rate", numeric=True),
            C("year", "year", numeric=True),
        ],
        "hospitals": [
            C("hospital", "hospital_entity", subject=True),
            C("address", "street"),
            C("city", "city"),
            C("postcode", "postcode"),
            C("beds", "bed_count", numeric=True),
        ],
        "hospital_waiting": [
            C("hospital", "hospital_entity", subject=True),
            C("specialty", "specialty"),
            C("weeks", "wait_weeks", numeric=True),
            C("patients_waiting", "waiting_count", numeric=True),
        ],
        "businesses": [
            C("company", "company_entity", subject=True),
            C("sector", "sector"),
            C("city", "city"),
            C("postcode", "postcode"),
            C("employees", "employee_count", numeric=True),
            C("revenue", "revenue_amount", numeric=True),
        ],
        "business_contacts": [
            C("company", "company_entity", subject=True),
            C("contact_email", "email"),
            C("phone", "phone"),
            C("city", "city"),
        ],
        "house_prices": [
            C("street", "street", subject=True),
            C("city", "city"),
            C("postcode", "postcode"),
            C("price", "price_amount", numeric=True),
            C("sale_date", "date"),
        ],
        "crimes": [
            C("crime_type", "crime", subject=True),
            C("street", "street"),
            C("city", "city"),
            C("month", "month"),
            C("reports", "report_count", numeric=True),
        ],
        "air_quality": [
            C("station_name", "station_entity", subject=True),
            C("city", "city"),
            C("pollutant", "pollutant"),
            C("reading", "reading_value", numeric=True),
            C("reading_date", "date"),
        ],
    }


BASE_SPECS = _base_specs()

# ---------------------------------------------------------------------------
# Ground truth
# ---------------------------------------------------------------------------


@dataclass
class GroundTruth:
    """Derivation-time ground truth at table and attribute granularity."""

    base_of: dict[str, str] = field(default_factory=dict)
    #: (table, column) -> (base table, base column, value domain)
    col_origin: dict[tuple[str, str], tuple[str, str, str]] = field(default_factory=dict)
    #: table -> subject attribute column name (post-rename), or None if dropped
    subject_of: dict[str, str | None] = field(default_factory=dict)

    def tables_related(self, t1: str, t2: str) -> bool:
        """Paper's Synthetic GT: related iff derived from the same base."""
        return t1 != t2 and self.base_of[t1] == self.base_of[t2]

    def related_tables(self, target: str) -> set[str]:
        base = self.base_of[target]
        return {t for t, b in self.base_of.items() if b == base and t != target}

    def domain_of(self, table: str, column: str) -> str:
        return self.col_origin[(table, column)][2]

    def attrs_related(self, t1: str, c1: str, t2: str, c2: str) -> bool:
        """Definition 1: values drawn from the same domain."""
        return self.domain_of(t1, c1) == self.domain_of(t2, c2)


# ---------------------------------------------------------------------------
# Entity pools (shared across base tables -> real join structure)
# ---------------------------------------------------------------------------


def _entities(rng: np.random.Generator, n: int) -> dict[str, list[dict]]:
    practices = [
        {
            "name": vocab.practice_name(rng),
            "street": vocab.street(rng),
            "city": vocab.city(rng),
            "postcode": vocab.postcode(rng),
        }
        for _ in range(n)
    ]
    schools = [
        {
            "name": vocab.school_name(rng),
            "street": vocab.street(rng),
            "city": vocab.city(rng),
            "postcode": vocab.postcode(rng),
        }
        for _ in range(n)
    ]
    hospitals = [
        {
            "name": vocab.hospital_name(rng),
            "street": vocab.street(rng),
            "city": vocab.city(rng),
            "postcode": vocab.postcode(rng),
        }
        for _ in range(max(10, n // 3))
    ]
    companies = [
        {
            "name": vocab.company_name(rng),
            "sector": vocab.SECTORS[rng.integers(0, len(vocab.SECTORS))],
            "city": vocab.city(rng),
            "postcode": vocab.postcode(rng),
        }
        for _ in range(n)
    ]
    return {
        "practice": practices,
        "school": schools,
        "hospital": hospitals,
        "company": companies,
    }


def _base_tables(rng: np.random.Generator, rows: int) -> dict[str, pd.DataFrame]:
    ent = _entities(rng, rows)
    pr, sc, ho, co = ent["practice"], ent["school"], ent["hospital"], ent["company"]

    def pick(pool, k):
        idx = rng.choice(len(pool), size=min(k, len(pool)), replace=False)
        return [pool[i] for i in idx]

    tables: dict[str, pd.DataFrame] = {}
    tables["gp_practices"] = pd.DataFrame(
        {
            "practice_name": [p["name"] for p in pr],
            "address": [p["street"] for p in pr],
            "city": [p["city"] for p in pr],
            "postcode": [p["postcode"] for p in pr],
            "patients": rng.integers(400, 15000, len(pr)),
        }
    )
    fund = pick(pr, int(rows * 0.8))
    tables["gp_funding"] = pd.DataFrame(
        {
            "practice": [p["name"] for p in fund],
            "city": [p["city"] for p in fund],
            "postcode": [p["postcode"] for p in fund],
            "payment": (rng.random(len(fund)) * 90000 + 10000).round(2),
        }
    )
    staff = pick(pr, int(rows * 0.7))
    tables["gp_staff"] = pd.DataFrame(
        {
            "practice": [p["name"] for p in staff],
            "gps": rng.integers(1, 15, len(staff)),
            "nurses": rng.integers(0, 20, len(staff)),
            "admin_staff": rng.integers(1, 25, len(staff)),
        }
    )
    tables["schools"] = pd.DataFrame(
        {
            "school_name": [s["name"] for s in sc],
            "street": [s["street"] for s in sc],
            "town": [s["city"] for s in sc],
            "postcode": [s["postcode"] for s in sc],
            "pupils": rng.integers(80, 2200, len(sc)),
        }
    )
    res = pick(sc, int(rows * 0.75))
    tables["school_results"] = pd.DataFrame(
        {
            "school": [s["name"] for s in res],
            "town": [s["city"] for s in res],
            "pass_rate": (rng.random(len(res)) * 60 + 40).round(1),
            "year": rng.integers(2015, 2021, len(res)),
        }
    )
    tables["hospitals"] = pd.DataFrame(
        {
            "hospital": [h["name"] for h in ho],
            "address": [h["street"] for h in ho],
            "city": [h["city"] for h in ho],
            "postcode": [h["postcode"] for h in ho],
            "beds": rng.integers(50, 1200, len(ho)),
        }
    )
    n_wait = max(20, rows)
    wait_h = [ho[i] for i in rng.integers(0, len(ho), n_wait)]
    tables["hospital_waiting"] = pd.DataFrame(
        {
            "hospital": [h["name"] for h in wait_h],
            "specialty": [vocab.SPECIALTIES[i] for i in rng.integers(0, len(vocab.SPECIALTIES), n_wait)],
            "weeks": rng.integers(1, 52, n_wait),
            "patients_waiting": rng.integers(5, 4000, n_wait),
        }
    )
    tables["businesses"] = pd.DataFrame(
        {
            "company": [c["name"] for c in co],
            "sector": [c["sector"] for c in co],
            "city": [c["city"] for c in co],
            "postcode": [c["postcode"] for c in co],
            "employees": rng.integers(1, 5000, len(co)),
            "revenue": (rng.random(len(co)) * 5e7 + 1e4).round(2),
        }
    )
    cont = pick(co, int(rows * 0.8))
    tables["business_contacts"] = pd.DataFrame(
        {
            "company": [c["name"] for c in cont],
            "contact_email": [vocab.email(rng, c["name"]) for c in cont],
            "phone": [vocab.phone(rng) for _ in cont],
            "city": [c["city"] for c in cont],
        }
    )
    n_hp = max(30, int(rows * 1.2))
    tables["house_prices"] = pd.DataFrame(
        {
            "street": [vocab.street(rng) for _ in range(n_hp)],
            "city": [vocab.city(rng) for _ in range(n_hp)],
            "postcode": [vocab.postcode(rng) for _ in range(n_hp)],
            "price": rng.integers(60000, 900000, n_hp),
            "sale_date": [vocab.date_str(rng) for _ in range(n_hp)],
        }
    )
    n_cr = max(30, int(rows * 1.5))
    tables["crimes"] = pd.DataFrame(
        {
            "crime_type": [vocab.CRIME_TYPES[i] for i in rng.integers(0, len(vocab.CRIME_TYPES), n_cr)],
            "street": [vocab.street(rng) for _ in range(n_cr)],
            "city": [vocab.city(rng) for _ in range(n_cr)],
            "month": [vocab.month_str(rng) for _ in range(n_cr)],
            "reports": rng.integers(1, 120, n_cr),
        }
    )
    n_aq = max(30, rows)
    stations = [f"{vocab.city(rng)} {s}" for s in ["Centre", "Roadside", "Suburban", "Industrial"]]
    tables["air_quality"] = pd.DataFrame(
        {
            "station_name": [stations[i] for i in rng.integers(0, len(stations), n_aq)],
            "city": [vocab.city(rng) for _ in range(n_aq)],
            "pollutant": [vocab.POLLUTANTS[i] for i in rng.integers(0, len(vocab.POLLUTANTS), n_aq)],
            "reading": (rng.random(n_aq) * 120).round(1),
            "reading_date": [vocab.date_str(rng) for _ in range(n_aq)],
        }
    )
    return tables


# ---------------------------------------------------------------------------
# Dirtiness model (Smaller-Real-style noise)
# ---------------------------------------------------------------------------


def _perturb_column(values: pd.Series, domain: str, rng: np.random.Generator) -> pd.Series:
    """One consistent format rewrite for a whole column — real sources are
    internally consistent but differ *from each other*, which is exactly
    what breaks equality-based value overlap while preserving tokens."""
    choice = rng.integers(0, 4)
    s = values.astype(str)
    if domain == "postcode":
        return s.str.replace(" ", "", regex=False) if choice % 2 == 0 else s.str.lower()
    if domain == "street":
        if choice == 0:
            for full, abbr in vocab.STREET_SUFFIX_ABBREV.items():
                s = s.str.replace(rf"\b{full}$", abbr, regex=True)
            return s
        if choice == 1:
            return s.str.upper()
        return s.str.replace(" ", ", ", n=1, regex=False)
    if choice == 0:
        return s.str.upper()
    if choice == 1:
        return s.str.lower()
    if choice == 2:
        return s.str.replace(" ", "_", regex=False)
    return s.str.title()


# ---------------------------------------------------------------------------
# Lake
# ---------------------------------------------------------------------------


@dataclass
class Lake:
    """A generated data lake: tables plus derivation-time ground truth."""

    tables: dict[str, pd.DataFrame]
    gt: GroundTruth
    noise: float
    seed: int

    @property
    def n_tables(self) -> int:
        return len(self.tables)

    @property
    def n_attributes(self) -> int:
        return sum(df.shape[1] for df in self.tables.values())


def generate_lake(
    *,
    derivations_per_base: int = 4,
    rows: int = 120,
    noise: float = 0.0,
    seed: int = 0,
    bases: list[str] | None = None,
) -> Lake:
    """Derive a lake from the base tables (TUS-benchmark procedure).

    Each derived table is a random projection (subset of columns, >= 2,
    subject column kept with probability 0.85) of a random selection
    (row sample, 40-90%) of one base table. ``noise`` in [0, 1] controls
    dirtiness: probability of a synonym rename and of a per-column format
    perturbation; nulls are injected at rate ``0.08 * noise``.
    """
    if not 0.0 <= noise <= 1.0:
        raise ValueError("noise must be in [0, 1]")
    rng = np.random.default_rng(seed)
    base_tables = _base_tables(rng, rows)
    specs = BASE_SPECS
    base_names = bases if bases is not None else sorted(base_tables)
    gt = GroundTruth()
    tables: dict[str, pd.DataFrame] = {}

    for base in base_names:
        bdf = base_tables[base]
        cols = specs[base]
        subject_col = next(c.name for c in cols if c.subject)
        for i in range(derivations_per_base):
            name = f"{base}__{i:03d}"
            keep = [
                c
                for c in cols
                if (c.name == subject_col and rng.random() < 0.85)
                or (c.name != subject_col and rng.random() < 0.75)
            ]
            if len(keep) < 2:
                keep = list(rng.choice(cols, size=2, replace=False))
            frac = 0.4 + 0.5 * rng.random()
            n_rows = max(5, int(len(bdf) * frac))
            row_idx = rng.choice(len(bdf), size=n_rows, replace=False)
            out = bdf.iloc[sorted(row_idx)][[c.name for c in keep]].reset_index(drop=True)

            renamed: dict[str, str] = {}
            for c in keep:
                new_name = c.name
                if noise > 0 and rng.random() < noise and c.name in SYNONYMS:
                    syns = SYNONYMS[c.name]
                    new_name = syns[rng.integers(0, len(syns))]
                renamed[c.name] = new_name
                if noise > 0 and not c.numeric and rng.random() < noise:
                    out[c.name] = _perturb_column(out[c.name], c.domain, rng)
                if noise > 0:
                    null_mask = rng.random(len(out)) < 0.08 * noise
                    if null_mask.any():
                        out.loc[null_mask, c.name] = None
            out = out.rename(columns=renamed)

            tables[name] = out
            gt.base_of[name] = base
            for c in keep:
                gt.col_origin[(name, renamed[c.name])] = (base, c.name, c.domain)
            gt.subject_of[name] = (
                renamed[subject_col] if subject_col in (c.name for c in keep) else None
            )

    return Lake(tables=tables, gt=gt, noise=noise, seed=seed)

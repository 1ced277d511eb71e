"""Company stand-in (paper: 128,889 sampled company records,
is-sentiment-negative task; error: inconsistent company names).

Mechanism: sentiment depends on sector and country; company names (and
the sector strings used as features) carry alternate surface forms
("Inc." suffixes, casing) on a large fraction of rows.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_inconsistency

N = 1000
SEED = 1103

_SECTORS = ["retail", "energy", "finance", "tech", "media"]
_SECTOR_VARIANTS = {
    "retail": "Retail.",
    "energy": "Energy!",
    "finance": "FINANCE",
    "tech": "Tech ",
    "media": "media/",
}
_COUNTRY_VARIANTS = {"usa": "USA.", "uk": "UK!", "germany": "GERMANY"}


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    sector = rng.choice(_SECTORS, N)
    country = rng.choice(["usa", "uk", "germany", "france", "india"], N)
    employees = np.round(np.exp(rng.normal(5.0, 1.2, N)), 0)
    sector_eff = pd.Series(sector).map(
        {"retail": 0.7, "energy": 0.9, "finance": 0.2, "tech": -0.8, "media": -0.1}
    ).to_numpy()
    country_eff = pd.Series(country).map(
        {"usa": -0.3, "uk": 0.1, "germany": -0.2, "france": 0.2, "india": 0.4}
    ).to_numpy()
    z = sector_eff + country_eff + 0.15 * (np.log(employees) - 5.0)
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "company_name": [f"company {i} holdings" for i in range(N)],
            "sector": sector,
            "country": country,
            "city": rng.choice(["c1", "c2", "c3", "c4"], N),
            "employees": employees,
            "is_negative": label,
        }
    )
    pdf = inject_inconsistency(pdf, "sector", _SECTOR_VARIANTS, 0.35, rng)
    return inject_inconsistency(pdf, "country", _COUNTRY_VARIANTS, 0.30, rng)


SPEC = DatasetSpec(
    name="Company",
    label="is_negative",
    numeric=("employees",),
    categorical=("sector", "country", "city"),
    error_types=("inconsistencies",),
    inconsistent_cols=("sector", "country"),
    generate=generate,
)

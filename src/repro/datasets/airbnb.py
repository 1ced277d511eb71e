"""Airbnb stand-in (paper: 42,492 hotel listings, rating-is-5 task;
errors: missing values, numerical outliers, ~10 % duplicates).

Mechanism: the latent 5-star propensity is driven by price, review
count, room type and city income; listing records then receive MCAR
missingness on demographic columns, gross scraping outliers on price /
review_count, and whole-record duplicates keyed on listing_id.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import (
    DatasetSpec,
    bernoulli_label,
    inject_duplicates,
    inject_gross_outliers,
    inject_missing,
)

N = 900
SEED = 1101


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    city = rng.choice(
        ["nyc", "la", "chicago", "miami", "austin", "seattle"], N
    )
    city_income = pd.Series(city).map(
        {"nyc": 85, "la": 75, "chicago": 65, "miami": 55, "austin": 70, "seattle": 90}
    ).to_numpy(dtype=float)
    room_type = rng.choice(["entire_home", "private_room", "shared_room"], N, p=[0.6, 0.3, 0.1])
    bedrooms = rng.integers(0, 5, N).astype(float)
    price = np.round(np.exp(rng.normal(4.3, 0.5, N)) + 20 * bedrooms, 2)
    review_count = rng.poisson(40, N).astype(float)
    population = np.round(rng.normal(2e6, 8e5, N), 0)
    z = (
        0.9 * (review_count - 40) / 20
        - 0.012 * (price - 90)
        + 0.02 * (city_income - 70)
        + np.where(room_type == "entire_home", 0.5, -0.3)
    )
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "listing_id": np.arange(1, N + 1),
            "city": city,
            "room_type": room_type,
            "bedrooms": bedrooms,
            "price": price,
            "review_count": review_count,
            "population": population,
            "median_income": city_income + rng.normal(0, 3, N),
            "is_five_star": label,
        }
    )
    pdf = inject_gross_outliers(pdf, ["price", "review_count"], 0.03, rng, scale=10)
    pdf = inject_missing(pdf, ["population", "median_income", "bedrooms"], 0.08, rng)
    return inject_duplicates(pdf, 0.10, rng)


SPEC = DatasetSpec(
    name="Airbnb",
    label="is_five_star",
    numeric=("bedrooms", "price", "review_count", "population", "median_income"),
    categorical=("city", "room_type"),
    error_types=("missing_values", "outliers", "duplicates"),
    key_cols=("listing_id",),
    generate=generate,
)

"""Restaurant stand-in (paper: 12,007 Yelp+Yellowpages records,
is-price-range-"$" task; errors: ~10 % duplicates, inconsistent city
and category strings).

Mechanism: price range follows category and city cost levels; the two
merged sources render city names differently ("new york" / "NYC") and
re-list 10 % of the restaurants.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_duplicates, inject_inconsistency

N = 1000
SEED = 1109

_CITY_VARIANTS = {
    "new york": "New York!",
    "los angeles": "Los Angeles.",
    "san francisco": "San-Francisco",
}
_CAT_VARIANTS = {"fast food": "Fast-Food", "coffee": "Coffee!", "pizza": "Pizza."}


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    city = rng.choice(["new york", "los angeles", "san francisco", "austin", "denver"], N)
    category = rng.choice(["fast food", "coffee", "pizza", "fine dining", "sushi"], N)
    rating = np.clip(rng.normal(3.8, 0.7, N), 1, 5)
    review_count = rng.poisson(60, N).astype(float)
    cat_eff = pd.Series(category).map(
        {"fast food": 1.6, "coffee": 1.1, "pizza": 0.8, "fine dining": -2.0, "sushi": -1.2}
    ).to_numpy()
    city_eff = pd.Series(city).map(
        {"new york": -0.5, "los angeles": -0.3, "san francisco": -0.6, "austin": 0.4, "denver": 0.3}
    ).to_numpy()
    z = cat_eff + city_eff + 0.1 * (3.8 - rating)
    label = bernoulli_label(z, rng)  # 1 = "$" cheap
    pdf = pd.DataFrame(
        {
            "rest_id": np.arange(1, N + 1),
            "city": city,
            "category": category,
            "rating": np.round(rating, 1),
            "review_count": review_count,
            "is_cheap": label,
        }
    )
    pdf = inject_inconsistency(pdf, "city", _CITY_VARIANTS, 0.30, rng)
    pdf = inject_inconsistency(pdf, "category", _CAT_VARIANTS, 0.25, rng)
    return inject_duplicates(pdf, 0.10, rng, bias_col="is_cheap", bias=3.0)


SPEC = DatasetSpec(
    name="Restaurant",
    label="is_cheap",
    numeric=("rating", "review_count"),
    categorical=("city", "category"),
    error_types=("duplicates", "inconsistencies"),
    key_cols=("rest_id",),
    inconsistent_cols=("city", "category"),
    generate=generate,
)

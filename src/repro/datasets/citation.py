"""Citation stand-in (paper: 5,005 publication titles from Google
Scholar + DBLP, is-the-paper-CS task; error: ~10 % duplicates).

Mechanism: titles are sampled bags of words from a CS vocabulary or a
non-CS (bio/econ) vocabulary with shared filler words; merging the two
"sources" introduces exact-duplicate records keyed on the title.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, inject_duplicates

N = 800
SEED = 1102

_CS = [
    "learning", "neural", "database", "query", "distributed", "compiler",
    "network", "algorithm", "graph", "parallel", "cache", "transaction",
]
_OTHER = [
    "protein", "gene", "market", "clinical", "policy", "cell",
    "enzyme", "trade", "patient", "inflation", "tissue", "fiscal",
]
_FILLER = ["analysis", "study", "novel", "approach", "evaluation", "model", "system", "data"]


def _title(rng: np.random.Generator, is_cs: bool) -> str:
    pool = _CS if is_cs else _OTHER
    words = list(rng.choice(pool, size=3, replace=False)) + list(
        rng.choice(_FILLER, size=2, replace=False)
    )
    rng.shuffle(words)
    return " ".join(words)


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    labels = rng.integers(0, 2, N)
    titles = [_title(rng, bool(y)) for y in labels]
    pdf = pd.DataFrame(
        {
            "title": titles,
            "venue_year": rng.integers(1995, 2020, N).astype(float),
            "is_cs": labels,
        }
    )
    return inject_duplicates(pdf, 0.10, rng)


SPEC = DatasetSpec(
    name="Citation",
    label="is_cs",
    numeric=("venue_year",),
    text=("title",),
    error_types=("duplicates",),
    key_cols=("title",),
    generate=generate,
)

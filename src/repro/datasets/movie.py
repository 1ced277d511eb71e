"""Movie stand-in (paper: 9,329 IMDB+TMDB reviews, romance-vs-comedy
task; errors: ~40 % duplicates, 48 % inconsistent language strings).

Mechanism: the genre is predicted from title words and score; the
language column renders "English" as "en" on ~48 % of rows (exactly the
paper's measured inconsistency rate) and the IMDB/TMDB merge re-adds
40 % of the records as duplicates keyed on the title.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_duplicates, inject_inconsistency

N = 1000
SEED = 1108

_ROM = ["love", "heart", "wedding", "paris", "forever", "kiss"]
_COM = ["crazy", "vacation", "buddy", "night", "party", "trouble"]
_FILL = ["story", "big", "last", "american", "perfect"]

# Surface-form variants mergeable by fingerprint clustering. The real
# dataset's "English"/"en" pair needs the dictionary merge the paper's
# authors performed manually in OpenRefine; see DESIGN.md.
_LANG_VARIANTS = {"English": "english!", "French": "FRENCH ", "Spanish": "spanish."}


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    label = rng.integers(0, 2, N)  # 1 = romance
    titles = []
    for y in label:
        pool = _ROM if y else _COM
        words = list(rng.choice(pool, 2, replace=False)) + list(rng.choice(_FILL, 1))
        rng.shuffle(words)
        titles.append(" ".join(words))
    language = rng.choice(["English", "French", "Spanish"], N, p=[0.75, 0.15, 0.10])
    score = np.clip(rng.normal(6.3 + 0.4 * (2 * label - 1), 1.0, N), 1, 10)
    runtime = rng.integers(80, 160, N).astype(float)
    z = 0.5 * (score - 6.3)
    _ = bernoulli_label(z, rng)  # keep RNG stream stable if mechanism evolves
    pdf = pd.DataFrame(
        {
            "title": titles,
            "language": language,
            "score": np.round(score, 1),
            "runtime": runtime,
            "is_romance": label,
        }
    )
    pdf = inject_inconsistency(pdf, "language", _LANG_VARIANTS, 0.48, rng)
    # The TMDB re-listings over-represent romance titles, so dedup
    # shifts the training prior (the paper's duplicate N flags stem
    # from exactly this class/duplication interaction).
    return inject_duplicates(pdf, 0.40, rng, bias_col="is_romance", bias=4.0)


SPEC = DatasetSpec(
    name="Movie",
    label="is_romance",
    numeric=("score", "runtime"),
    categorical=("language",),
    text=("title",),
    error_types=("duplicates", "inconsistencies"),
    key_cols=("title",),
    inconsistent_cols=("language",),
    generate=generate,
)

"""CleanML relational schema constants (paper §2.1, Tables 1, 4, 5).

Scenario "BD" compares a model trained on the dirty vs. cleaned
training set, both evaluated on the cleaned test set; "CD" compares
one clean-trained model on the dirty vs. cleaned test set. Missing
values replace "dirty" with the deletion dataset (Table 5) and only
admit scenario BD.
"""

SCENARIOS = ("BD", "CD")

# The "before" training version per error type (Table 4 vs Table 5).
DIRTY = "dirty"
DELETE_BASELINE = "delete"


def baseline_for(error_type: str) -> str:
    """Training-set version that plays the 'before' role."""
    return DELETE_BASELINE if error_type == "missing_values" else DIRTY


BASELINE = baseline_for


def scenarios_for(error_type: str) -> tuple[str, ...]:
    """Valid scenarios per error type (§3.4: missing values are BD-only)."""
    return ("BD",) if error_type == "missing_values" else SCENARIOS


# Column order of the results DataFrame produced by the harness.
RESULT_COLUMNS = [
    "dataset",
    "error_type",
    "detect",
    "repair",
    "split_seed",
    "train_version",
    "model",
    "search_seed",
    "test_variant",
    "val_metric",
    "test_metric",
]

# Key attributes of the three relations (Table 1), minus Flag.
R1_KEY = ["dataset", "error_type", "detect", "repair", "model", "scenario"]
R2_KEY = ["dataset", "error_type", "detect", "repair", "scenario"]
R3_KEY = ["dataset", "error_type", "scenario"]

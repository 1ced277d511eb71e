"""Registry of error types and cleaning methods (paper Table 2)."""
from dataclasses import dataclass

ERROR_TYPES = (
    "missing_values",
    "outliers",
    "duplicates",
    "inconsistencies",
    "mislabels",
)

# Imputation method names follow the paper: "<numeric> <categorical>"
# e.g. mean_mode = numeric mean + categorical mode; *_dummy uses the
# dedicated "missing" category for categoricals.
MISSING_IMPUTATIONS = (
    "mean_mode",
    "median_mode",
    "mode_mode",
    "mean_dummy",
    "median_dummy",
    "mode_dummy",
)

OUTLIER_DETECTORS = ("SD", "IQR", "IF")
OUTLIER_REPAIRS = ("delete", "impute_mean", "impute_median", "impute_mode")


@dataclass(frozen=True)
class CleaningMethod:
    """One (detect, repair) combination for an error type."""

    error_type: str
    detect: str
    repair: str

    @property
    def name(self) -> str:
        return f"{self.error_type}:{self.detect}:{self.repair}"


def methods_for(error_type: str) -> tuple[CleaningMethod, ...]:
    """All cleaning methods of Table 2 for one error type.

    For missing values the ``delete`` repair is the comparison baseline
    (case "B" in Table 5) rather than a cleaning method under test, so
    it is not returned here; the harness adds the deletion version as
    the "before" side.
    """
    if error_type == "missing_values":
        return tuple(
            CleaningMethod(error_type, "empty_entry", rep)
            for rep in MISSING_IMPUTATIONS
        )
    if error_type == "outliers":
        return tuple(
            CleaningMethod(error_type, det, rep)
            for det in OUTLIER_DETECTORS
            for rep in OUTLIER_REPAIRS
        )
    if error_type == "duplicates":
        return (CleaningMethod(error_type, "key_collision", "delete"),)
    if error_type == "inconsistencies":
        return (CleaningMethod(error_type, "openrefine_fingerprint", "merge"),)
    if error_type == "mislabels":
        return (CleaningMethod(error_type, "ground_truth", "flip"),)
    raise KeyError(f"unknown error type {error_type!r}")

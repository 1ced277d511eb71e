"""CleanML flag rule (§4.2.2): map the three p-values to P / N / S."""
from enum import Enum


class Flag(str, Enum):
    """Impact of cleaning on the ML metric for one experiment."""

    POSITIVE = "P"
    NEGATIVE = "N"
    INSIGNIFICANT = "S"


def decide_flag(p_two: float, p_upper: float, p_lower: float, alpha: float = 0.05) -> Flag:
    """Apply the paper's decision procedure.

    (1) p0 > alpha            -> "S"
    (2) p0 < alpha, p1 < alpha -> "P"
    (3) p0 < alpha, p2 < alpha -> "N"

    If the two-tailed test rejects but neither one-tailed test does
    (possible only at the alpha boundary), the result is conservatively
    "S".
    """
    if p_two > alpha:
        return Flag.INSIGNIFICANT
    if p_upper < alpha:
        return Flag.POSITIVE
    if p_lower < alpha:
        return Flag.NEGATIVE
    return Flag.INSIGNIFICANT

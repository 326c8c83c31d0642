"""Validation-function-based column-type detection (paper §3(4)).

Eight real validator implementations in the spirit of DataPrep/Validators —
including Luhn's checksum, the paper's own example. f_fun^d(f, v) = 0 if the
validator accepts v else 1 (Equation 4).
"""
from __future__ import annotations

import re
from datetime import datetime

from repro.typedetect.base import normalize_value

_URL_RE = re.compile(r"^https?://[a-z0-9.-]+\.[a-z]{2,}(/\S*)?$")
_EMAIL_RE = re.compile(r"^[a-z0-9._%+-]+@[a-z0-9.-]+\.[a-z]{2,}$")
_ZIP_RE = re.compile(r"^\d{5}$")
_TIME_RE = re.compile(r"^([01]\d|2[0-3]):[0-5]\d(:[0-5]\d)?$")
_NUM_UNIT_RE = re.compile(r"^\d+(\.\d+)?\s?[a-z%]{1,12}$")

_DATE_FORMATS = ("%m/%d/%Y", "%m/%d/%y", "%Y-%m-%d", "%d-%m-%Y")


def validate_date(v: str) -> bool:
    for fmt in _DATE_FORMATS:
        try:
            datetime.strptime(v, fmt)
            return True
        except ValueError:
            continue
    return False


def validate_time(v: str) -> bool:
    return bool(_TIME_RE.match(v))


def validate_url(v: str) -> bool:
    return bool(_URL_RE.match(v))


def validate_email(v: str) -> bool:
    return bool(_EMAIL_RE.match(v))


def validate_ipv4(v: str) -> bool:
    parts = v.split(".")
    if len(parts) != 4:
        return False
    try:
        return all(0 <= int(p) <= 255 and p == str(int(p)) for p in parts)
    except ValueError:
        return False


def validate_zip(v: str) -> bool:
    return bool(_ZIP_RE.match(v))


def validate_luhn(v: str) -> bool:
    """Luhn checksum (credit-card / UPC style), 12-19 digits."""
    if not v.isdigit() or not (12 <= len(v) <= 19):
        return False
    total = 0
    for i, ch in enumerate(reversed(v)):
        d = int(ch)
        if i % 2 == 1:
            d *= 2
            if d > 9:
                d -= 9
        total += d
    return total % 10 == 0


def validate_num_unit(v: str) -> bool:
    """Number-with-unit measurements ("12 oz", "0.05%")."""
    return bool(_NUM_UNIT_RE.match(v))


VALIDATORS = {
    "validate_date": validate_date,
    "validate_time": validate_time,
    "validate_url": validate_url,
    "validate_email": validate_email,
    "validate_ipv4": validate_ipv4,
    "validate_zip": validate_zip,
    "validate_luhn": validate_luhn,
    "validate_num_unit": validate_num_unit,
}


def function_distance(name: str, value: str) -> float:
    """f_fun^d in {0, 1} on the normalized value."""
    return 0.0 if VALIDATORS[name](normalize_value(value)) else 1.0

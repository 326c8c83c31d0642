"""Tests for the validation functions (paper §3(4))."""
import pytest
from hypothesis import given, strategies as st

from repro.typedetect.function import VALIDATORS, function_distance


@pytest.mark.parametrize(
    "name,good,bad",
    [
        ("validate_date", "12/3/2020", "new facility"),
        ("validate_date", "2020-01-03", "13/45/2020"),
        ("validate_time", "23:59:59", "25:00:00"),
        ("validate_time", "08:30", "8:3"),
        ("validate_url", "https://twitter.com/a/status/803706", "_/status/799512626703323140"),
        ("validate_url", "http://data.gov", "data.gov"),
        ("validate_email", "a.b@corp.net", "a.b_corp.net"),
        ("validate_ipv4", "192.168.0.1", "300.1.1.1"),
        ("validate_ipv4", "0.0.0.0", "1.2.3"),
        ("validate_zip", "02139", "2139"),
        ("validate_luhn", "79927398713", None),  # 11 digits: too short -> invalid
        ("validate_num_unit", "12 oz", "twelve oz"),
        ("validate_num_unit", "0.05%", "% 5"),
    ],
)
def test_validators(name, good, bad):
    fn = VALIDATORS[name]
    if name == "validate_luhn" and good == "79927398713":
        assert not fn(good)  # length gate
        return
    assert fn(good), (name, good)
    if bad is not None:
        assert not fn(bad), (name, bad)


def test_luhn_accepts_valid_card():
    assert VALIDATORS["validate_luhn"]("4532015112830366")


def test_luhn_rejects_off_by_one():
    assert not VALIDATORS["validate_luhn"]("4532015112830367")


@given(st.text(max_size=30))
def test_validators_never_crash(s):
    for name, fn in VALIDATORS.items():
        assert fn(s) in (True, False)


def test_function_distance_binary_and_normalized():
    assert function_distance("validate_date", " 12/3/2020 ") == 0.0
    assert function_distance("validate_date", "hello") == 1.0


def test_eight_validators():
    assert len(VALIDATORS) == 8

"""Unit tests for the experiment harness utilities."""
import pytest

from repro.experiments.harness import OOM, fmt, format_table, run_timed, speedup_over


def test_fmt_float_sig_figs():
    assert fmt(1.23456789) == "1.235"
    assert fmt(0.000123456) == "0.0001235"
    assert fmt(0.0) == "0"


def test_fmt_passthrough():
    assert fmt("O.O.M.") == "O.O.M."
    assert fmt(7) == "7"


def test_run_timed_returns_elapsed():
    out, t = run_timed(lambda: 42)
    assert out == 42
    assert isinstance(t, float) and t >= 0


def test_speedup_over_annotates():
    rows = [{"t": 2.0}, {"t": 4.0}, {"t": OOM}]
    speedup_over(rows, "t", 4.0)
    assert rows[0]["speedup"] == pytest.approx(2.0)
    assert rows[1]["speedup"] == pytest.approx(1.0)
    assert rows[2]["speedup"] == ""


def test_format_table_column_selection():
    rows = [{"a": 1, "b": 2, "c": 3}]
    out = format_table("T", rows, columns=["c", "a"])
    assert "| c | a |" in out and "b" not in out.split("\n")[2]

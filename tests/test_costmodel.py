"""Analytic cost model (storage/costmodel.py)."""
import pytest

from repro.storage import costmodel as CM


def test_read_seconds_math():
    page = 64 * 2**20
    assert CM.SSD.read_seconds(page) == pytest.approx(0.0002 + 64 / 128, rel=1e-6)
    assert CM.HDD.read_seconds(page) == pytest.approx(0.010 + 64 / 15, rel=1e-6)


def test_hdd_slower_than_ssd():
    page = 64 * 2**20
    assert CM.HDD.read_seconds(page) > 4 * CM.SSD.read_seconds(page)
    assert CM.HDD.write_seconds(page) > CM.SSD.write_seconds(page)


def test_disks_registry():
    assert set(CM.DISKS) == {"SSD", "HDD"}
    assert CM.DISKS["SSD"] is CM.SSD


def test_compute_seconds():
    assert CM.compute_seconds(2e9, 2.0) == pytest.approx(1.0)


def test_write_seconds_positive():
    assert CM.SSD.write_seconds(1) > 0

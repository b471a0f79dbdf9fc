"""Benchmark fixtures: cached benchmark lakes under data/."""
import pytest


@pytest.fixture(scope="session")
def tptr_small(spark):
    from repro.harness.experiments import get_tptr

    return get_tptr(spark, "tptr_small")


@pytest.fixture(scope="session")
def tptr_med(spark):
    from repro.harness.experiments import get_tptr

    return get_tptr(spark, "tptr_med")


@pytest.fixture(scope="session")
def wdc_t2d(spark):
    from repro.harness.experiments import get_webbench

    return get_webbench("wdc_t2d")

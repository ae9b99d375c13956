"""Shared fixtures for the test suite.

The expensive artifacts (tiny datasets, signal bundles, a converged
JOCL run) are session-scoped: many test modules assert different
properties of the same pipeline products.
"""
from __future__ import annotations

import pytest

from repro.core.jocl import JOCLConfig, build_signals
from repro.okbgen.okb import nytimes2018_lite, reverb45k_lite

TINY_SF = 0.004


@pytest.fixture(scope="session")
def reverb_tiny():
    return reverb45k_lite(sf=TINY_SF)


@pytest.fixture(scope="session")
def nyt_tiny():
    return nytimes2018_lite(sf=TINY_SF)


@pytest.fixture(scope="session")
def quick_cfg():
    return JOCLConfig(lbp_iters=6, learn_lbp_iters=3, epochs=1)


@pytest.fixture(scope="session")
def reverb_signals(spark, reverb_tiny, quick_cfg):
    return build_signals(spark, reverb_tiny, quick_cfg)

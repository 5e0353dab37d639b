"""Shared fixtures: small generated datasets reused across test modules."""
import pytest

from repro.core.records import build_records
from repro.datasets.registry import spec as get_spec
from repro.datasets.generator import generate


@pytest.fixture(scope="session")
def cora_small():
    """~10% Cora: (spec, pdf, records, truth)."""
    sp = get_spec("cora", 0.10)
    pdf = generate(sp)
    recs, truth = build_records(pdf, sp)
    return sp, pdf, recs, truth


@pytest.fixture(scope="session")
def wa_small():
    """~20% Walmart-Amazon (hard dataset): (spec, pdf, records, truth)."""
    sp = get_spec("wa", 0.20)
    pdf = generate(sp)
    recs, truth = build_records(pdf, sp)
    return sp, pdf, recs, truth


@pytest.fixture(scope="session")
def clean_records():
    """A deliberately easy dataset (low noise) for exactness tests."""
    from dataclasses import replace

    sp = replace(
        get_spec("cora", 0.08), noise=0.05, confusability=0.05, seed=77
    )
    pdf = generate(sp)
    recs, truth = build_records(pdf, sp)
    return sp, pdf, recs, truth

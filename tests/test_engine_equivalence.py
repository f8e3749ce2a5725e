"""Cross-engine equivalence (the paper's §3.7 correctness claim).

All four engines run the same AppSpec; for monotone min/max applications
every engine — including SLFE with delayed computation — must converge to
the *identical* fixpoint.
"""
from __future__ import annotations

import numpy as np
import pytest

MINMAX = ["SSSP", "CC", "WP"]
OTHERS = ["powergraph", "powerlyra", "slfe"]


@pytest.mark.parametrize("other", OTHERS)
@pytest.mark.parametrize("app", MINMAX)
class TestMinMaxFixpointIdentical:
    def test_fig1(self, fig1, get_run, other, app):
        base = get_run(fig1, "gemini", app, root=0).values_np()
        got = get_run(fig1, other, app, root=0).values_np()
        assert np.array_equal(base, got)

    def test_pk(self, pk_small, get_run, other, app):
        base = get_run(pk_small, "gemini", app).values_np()
        got = get_run(pk_small, other, app).values_np()
        assert np.array_equal(base, got)

    def test_lj(self, lj_small, get_run, other, app):
        base = get_run(lj_small, "gemini", app).values_np()
        got = get_run(lj_small, other, app).values_np()
        assert np.array_equal(base, got)


@pytest.mark.parametrize("app", ["PR", "TR"])
def test_gas_matches_gemini_arith(pk_small, get_run, app):
    """GAS gathers only signalled vertices but recomputes full sums, so it
    tracks the always-pull Gemini values to within the stability
    granularity used for signalling."""
    a = get_run(pk_small, "gemini", app).values_np()
    b = get_run(pk_small, "powergraph", app).values_np()
    assert np.allclose(a, b, rtol=5e-2, atol=5e-3)


@pytest.mark.parametrize("app", ["PR", "TR"])
def test_slfe_tracks_gemini_arith(pk_small, get_run, app):
    a = get_run(pk_small, "gemini", app).values_np()
    b = get_run(pk_small, "slfe", app).values_np()
    assert np.allclose(a, b, rtol=0.1, atol=5e-2)


def test_powerlyra_equals_powergraph_values(pk_small, get_run):
    """Hybrid-cut changes communication cost, never values."""
    for app in MINMAX:
        a = get_run(pk_small, "powergraph", app).values_np()
        b = get_run(pk_small, "powerlyra", app).values_np()
        assert np.array_equal(a, b)

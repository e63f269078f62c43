"""Theory: zeta function, Theorem 1 bound, Table 1 values."""
import math

import pytest

from repro.core import bounds
from repro.tables.table1 import ALPHAS, PAPER, computed_value, table1_rows

# Reference zeta values (Abramowitz & Stegun / mpmath, 12 digits).
ZETA_REF = {
    1.2: 5.591582441177,
    1.5: 2.612375348685,
    2.0: 1.644934066848,
    2.2: 1.490543257469,
    3.0: 1.202056903160,
    4.0: 1.082323233711,
}


@pytest.mark.parametrize("s,ref", sorted(ZETA_REF.items()))
def test_zeta_accuracy(s, ref):
    assert bounds.zeta(s) == pytest.approx(ref, rel=1e-9)


def test_zeta_requires_s_gt_1():
    with pytest.raises(ValueError):
        bounds.zeta(1.0)


def test_zeta_pmf_normalised():
    pmf = bounds.zeta_degree_pmf(2.5, 100_000)
    assert pmf.sum() == pytest.approx(1.0, abs=1e-4)


def test_theorem1_formula():
    assert bounds.theorem1_ub(100, 500, 8) == pytest.approx(6.08)


def test_theorem1_decreases_in_vertices():
    assert bounds.theorem1_ub(1000, 500, 8) < bounds.theorem1_ub(100, 500, 8)


# ---------- Table 1: Distributed NE row reproduces EXACTLY ----------
@pytest.mark.parametrize("alpha", ALPHAS)
def test_dne_powerlaw_ub_matches_paper(alpha):
    assert bounds.dne_powerlaw_ub(alpha) == pytest.approx(
        PAPER["distributed_ne"][alpha], abs=0.005
    )


# ---------- Table 1: hash rows reproduce within documented tolerance ----
_HASH_TOL = {"random": 0.12, "grid": 0.20, "dbh": 0.30}


@pytest.mark.parametrize("method", ["random", "grid", "dbh"])
@pytest.mark.parametrize("alpha", [2.4, 2.6, 2.8])
def test_hash_bounds_close_to_paper(method, alpha):
    """alpha >= 2.4 under the continuous-Pareto model: Random matches the
    paper within ~12%, Grid ~20%, the mean-field DBH re-derivation ~30%
    (alpha = 2.2 deviates more for all; see EXPERIMENTS.md on [49]'s
    unspecified degree parameterisation)."""
    got = computed_value(method, alpha)
    assert got == pytest.approx(PAPER[method][alpha], rel=_HASH_TOL[method])


@pytest.mark.parametrize("alpha", ALPHAS)
def test_ordering_preserved(alpha):
    """Whatever the absolute values, the paper's headline ranking must
    hold: D.NE's bound below Random and Grid everywhere, and below DBH
    for alpha >= 2.4 (at alpha = 2.2 our re-derived DBH mean-field sits
    below D.NE's UB — see EXPERIMENTS.md); Random worst of the family."""
    dne = computed_value("distributed_ne", alpha)
    rand = computed_value("random", alpha)
    grid = computed_value("grid", alpha)
    dbh = computed_value("dbh", alpha)
    assert dne < min(rand, grid)
    if alpha >= 2.4:
        assert dne < dbh
    assert rand >= max(grid, dbh)


@pytest.mark.parametrize("method", ["random", "grid", "dbh", "distributed_ne"])
def test_bounds_decrease_with_alpha(method):
    vals = [computed_value(method, a) for a in ALPHAS]
    assert vals == sorted(vals, reverse=True)


def test_random_rf_capped_by_mean_degree():
    """Information-theoretic cap: RF <= mean degree under the zeta model
    (the reason the paper's hash rows cannot come from zeta(dmin=1))."""
    for a in ALPHAS:
        mean_deg = bounds.zeta(a - 1) / bounds.zeta(a)
        assert bounds.random_rf(a, 256, model="zeta") <= mean_deg + 1e-9


def test_random_rf_increases_with_parts():
    assert bounds.random_rf(2.4, 1024) > bounds.random_rf(2.4, 16)


def test_grid_below_random():
    for a in ALPHAS:
        for model in ("zeta", "pareto"):
            assert bounds.grid_rf(a, 256, model) < bounds.random_rf(a, 256, model)


def test_dbh_below_random():
    for a in ALPHAS:
        assert bounds.dbh_rf(a, 256, "pareto") < bounds.random_rf(a, 256, "pareto")


def test_unknown_degree_model():
    with pytest.raises(ValueError):
        bounds.random_rf(2.4, 64, model="cauchy")


def test_table1_rows_structure():
    rows = table1_rows()
    assert [r["partitioner"] for r in rows] == [
        "random",
        "grid",
        "dbh",
        "distributed_ne",
    ]
    for r in rows:
        for a in ALPHAS:
            assert math.isfinite(r[f"a={a}"])
            assert r[f"paper a={a}"] == PAPER[r["partitioner"]][a]

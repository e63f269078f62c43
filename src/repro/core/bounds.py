"""Theoretical replication-factor bounds (Theorem 1 and Table 1).

Implements:

- ``theorem1_ub`` — Theorem 1: RF <= (|E| + |V| + |P|) / |V|.
- ``dne_powerlaw_ub`` — the paper's expected upper bound for Distributed
  NE on a zeta-distributed power-law graph (d_min = 1):
  E[UB] ~ 0.5 * zeta(alpha-1) / zeta(alpha) + 1.
- ``random_rf`` / ``grid_rf`` / ``dbh_rf`` — expected replication factor
  of the hash-based baselines on the same degree distribution, after
  Xie et al. [49]. The paper reprints only the *values* (Table 1), not
  the closed forms, so these are re-derived:

  * Random (1D hash): a degree-d vertex is replicated on the distinct
    partitions hit by d uniform draws: E = p * (1 - (1 - 1/p)^d).
  * Grid (2D hash): a vertex's edges are confined to the 2*sqrt(p) - 1
    cells of its row+column: E = c * (1 - (1 - 1/c)^d), c = 2*sqrt(p)-1.
  * DBH: each edge is hashed by its lower-degree endpoint. Under a
    mean-field model (neighbor degrees i.i.d. size-biased), a degree-d
    vertex loses each incident edge to its neighbor's hash with
    probability q(d) = Pr[D' < d] + 0.5 * Pr[D' = d]; the lost edges
    land on m ~ Binomial(d, q) uniform partitions and the kept edges
    all land on h(v). With E[(1-1/p)^m] = (1 - q/p)^d this gives the
    closed form
      E[repl | d] = p*(1 - (1 - q/p)^d) + ((1 - q/p)^d - (q*(1-1/p))^d).

Degree models. The paper's own D.NE row assumes the *discrete zeta*
distribution with d_min = 1 (it reproduces exactly under it). The hash
rows are copied from [49] and provably cannot come from that model:
under zeta(d_min=1) the mean degree at alpha=2.2 is 3.75 and RF <= mean
degree always, yet the paper prints Random = 5.88. A continuous Pareto
density f(d) = (alpha-1) d^-alpha (heavier tail, mean (alpha-1)/(alpha-2))
reproduces the printed hash values within a few percent at alpha >= 2.4,
so each hash formula takes ``model={"zeta","pareto"}``; Table 1 uses
"pareto" for the hash rows and documents the discrepancy in
EXPERIMENTS.md.

No SciPy in the container: the Riemann zeta function is computed by
direct summation with an Euler–Maclaurin tail correction.
"""
import numpy as np

_DMAX = 2_000_000  # degree-support truncation for expectations


def zeta(s: float, n_terms: int = 10_000) -> float:
    """Riemann zeta via partial sum + Euler–Maclaurin tail (s > 1)."""
    if s <= 1.0:
        raise ValueError("zeta(s) requires s > 1")
    n = np.arange(1, n_terms + 1, dtype=np.float64)
    partial = float(np.sum(n**-s))
    big_n = float(n_terms)
    tail = (
        big_n ** (1.0 - s) / (s - 1.0)
        - 0.5 * big_n**-s
        + s / 12.0 * big_n ** (-s - 1.0)
    )
    return partial + tail


def zeta_degree_pmf(alpha: float, dmax: int = _DMAX) -> np.ndarray:
    """P[d] = d^-alpha / zeta(alpha) for d = 1..dmax (index 0 -> d=1)."""
    d = np.arange(1, dmax + 1, dtype=np.float64)
    w = d**-alpha
    return w / zeta(alpha)


def theorem1_ub(n_vertices: int, n_edges: int, n_parts: int) -> float:
    """Theorem 1: RF of Distributed NE <= (|E| + |V| + |P|) / |V|."""
    return (n_edges + n_vertices + n_parts) / n_vertices


def dne_powerlaw_ub(alpha: float) -> float:
    """E[UB] for Distributed NE on a zeta power-law graph (|P|/|V| ~ 0)."""
    return 0.5 * zeta(alpha - 1.0) / zeta(alpha) + 1.0


def _degree_grid(alpha: float, model: str, dmax: int):
    """(degree values, probability weights) for the chosen degree model."""
    if model == "zeta":
        d = np.arange(1, dmax + 1, dtype=np.float64)
        return d, zeta_degree_pmf(alpha, dmax)
    if model == "pareto":
        # log grid over [1, 1e8]; weights = pdf * cell width, renormalised.
        d = np.exp(np.linspace(0.0, np.log(1e8), 400_000))
        w = (alpha - 1.0) * d**-alpha * np.gradient(d)
        return d, w / w.sum()
    raise ValueError(f"unknown degree model {model!r}")


def random_rf(alpha: float, p: int, model: str = "zeta", dmax: int = _DMAX) -> float:
    """Expected RF of 1D random hash partitioning on a power-law graph."""
    d, w = _degree_grid(alpha, model, dmax)
    repl = p * (1.0 - np.exp(d * np.log1p(-1.0 / p)))
    return float(w @ repl)


def grid_rf(alpha: float, p: int, model: str = "zeta", dmax: int = _DMAX) -> float:
    """Expected RF of 2D (grid) hash partitioning on a power-law graph."""
    c = 2.0 * np.sqrt(p) - 1.0
    d, w = _degree_grid(alpha, model, dmax)
    repl = c * (1.0 - np.exp(d * np.log1p(-1.0 / c)))
    return float(w @ repl)


def dbh_rf(alpha: float, p: int, model: str = "zeta", dmax: int = _DMAX) -> float:
    """Expected RF of degree-based hashing (DBH) — mean-field closed form."""
    d, w = _degree_grid(alpha, model, dmax)
    # Size-biased neighbor-degree distribution: Pr[D'=k] ~ k * P[k].
    sb = d * w
    sb /= sb.sum()
    cdf = np.cumsum(sb)
    # q(d): probability an incident edge is hashed by the *neighbor*
    # (its degree is strictly lower; ties split evenly).
    q = np.empty(len(d))
    q[0] = 0.5 * sb[0]
    q[1:] = cdf[:-1] + 0.5 * sb[1:]
    one_minus_qp = np.clip(1.0 - q / p, 1e-300, 1.0)
    keep_all_away = np.clip(q * (1.0 - 1.0 / p), 0.0, 1.0)
    term_away = p * (1.0 - np.exp(d * np.log(one_minus_qp)))
    with np.errstate(divide="ignore"):
        log_kaa = np.where(keep_all_away > 0, np.log(keep_all_away), -np.inf)
    term_self = np.exp(d * np.log(one_minus_qp)) - np.exp(d * log_kaa)
    return float(np.dot(w, term_away + term_self))

"""Table harnesses: structure, paper columns, and shape on mini configs."""
import math

import pytest

from repro.tables import fmt, table1, table2
from repro.tables.table4 import table4_rows
from repro.tables.table5 import METHODS, table5_rows
from repro.tables.table6 import ORDER, table6_rows


# ---------- fmt ----------
def test_render_alignment():
    out = fmt.render([{"a": 1, "bb": 2.5}, {"a": 10, "bb": 3.25}], title="T")
    lines = out.splitlines()
    assert lines[0] == "T"
    assert "a" in lines[1] and "bb" in lines[1]
    assert len(lines) == 5


def test_render_empty():
    assert "(empty)" in fmt.render([], title="x")


def test_render_markdown():
    out = fmt.render_markdown([{"a": 1}], title="M")
    assert out.splitlines()[0] == "### M"
    assert "| a |" in out


# ---------- table 1 ----------
def test_table1_complete():
    rows = table1.table1_rows()
    assert len(rows) == 4
    for r in rows:
        assert len(r) == 1 + 2 * len(table1.ALPHAS)


# ---------- table 2 ----------
def test_table2_rows(spark):
    rows = table2.table2_rows(spark)
    names = {r["dataset"] for r in rows}
    assert "pokec_lite" in names and "calif_lite" in names
    for r in rows:
        assert r["E"] > 0 and r["V"] > 0
        # substitutes keep the original family's density regime
        if r["kind"] == "road":
            assert r["E/V"] < 2.0
        if r["dataset"] == "orkut_lite":
            assert r["E/V"] > 8


# ---------- table 4 (mini config) ----------
@pytest.fixture(scope="module")
def mini_t4(spark):
    return table4_rows(spark, n_parts=8, graphs=["rmat_tiny"], seed=0, lam=0.25)


def test_table4_structure(mini_t4):
    methods = [r["method"] for r in mini_t4]
    assert methods == ["hdrf", "ne", "sne", "distributed_ne"]
    for r in mini_t4:
        assert r["rf"] >= 1.0 and r["time_s"] > 0
        assert "paper_rf" in r  # NaN for the synthetic test graph


def test_table4_paper_columns_on_paper_graph():
    from repro.tables.table4 import PAPER_RF, PAPER_TIME

    for m in ("hdrf", "ne", "sne", "distributed_ne"):
        for g in ("pokec_lite", "flickr_lite", "livej_lite", "orkut_lite"):
            assert math.isfinite(PAPER_RF[m][g])
            assert math.isfinite(PAPER_TIME[m][g])


def test_table4_shape_ne_best_hdrf_worst(mini_t4):
    rf = {r["method"]: r["rf"] for r in mini_t4}
    assert rf["ne"] <= rf["distributed_ne"]
    assert rf["distributed_ne"] < rf["hdrf"]


# ---------- table 5 (mini config) ----------
@pytest.fixture(scope="module")
def mini_t5(spark):
    return table5_rows(
        spark,
        n_parts=8,
        graphs=["rmat_tiny"],
        methods=["random", "grid", "distributed_ne"],
        seed=0,
        lam=0.5,
        pr_iters=3,
    )


def test_table5_structure(mini_t5):
    q_rows, a_rows = mini_t5
    assert len(q_rows) == 3
    assert len(a_rows) == 9  # 3 methods x 3 apps
    apps = {r["app"] for r in a_rows}
    assert apps == {"sssp", "wcc", "pagerank"}


def test_table5_shape_dne_best_rf(mini_t5):
    q_rows, _ = mini_t5
    rf = {r["method"]: r["rf"] for r in q_rows}
    assert rf["distributed_ne"] < rf["grid"] < rf["random"]


def test_table5_shape_dne_lowest_com(mini_t5):
    _, a_rows = mini_t5
    for app in ("sssp", "wcc", "pagerank"):
        com = {r["method"]: r["com_mb"] for r in a_rows if r["app"] == app}
        assert com["distributed_ne"] < com["random"]


def test_table5_pagerank_et_ordering(mini_t5):
    """The paper's headline: D.NE wins PR elapsed time."""
    _, a_rows = mini_t5
    et = {r["method"]: r["et"] for r in a_rows if r["app"] == "pagerank"}
    assert et["distributed_ne"] < et["random"]


def test_table5_method_registry():
    assert METHODS == ["random", "grid", "oblivious", "hybrid_ginger", "distributed_ne"]


# ---------- table 6 (mini config) ----------
@pytest.fixture(scope="module")
def mini_t6(spark):
    return table6_rows(spark, n_parts=8, graphs=["penn_lite"], seed=0)


def test_table6_structure(mini_t6):
    assert len(mini_t6) == 1
    row = mini_t6[0]
    for name in ORDER:
        assert row[name] >= 1.0
        assert row[f"paper:{name}"] > 0


def test_table6_shape_quality_family_near_ideal(mini_t6):
    """Paper §7.7: high-quality family at ~1.0x, hashing at ~3.5x."""
    row = mini_t6[0]
    for name in ("parmetis", "sheep", "xtrapulp", "distributed_ne"):
        assert row[name] < 1.6, name
    assert row["random"] > 1.8
    assert row["distributed_ne"] < row["random"]
    assert row["distributed_ne"] < row["oblivious"]

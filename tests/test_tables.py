"""Table harnesses: structure of the produced frames and the paper-shape
invariants they must exhibit at unit-test scale."""
import numpy as np
import pytest

from repro.bench.tables import (
    PAPER_TABLE1,
    T3_TASKS,
    table1,
    table2,
    table3,
    table4,
    to_markdown,
)

SF = 0.05


@pytest.fixture(scope="module")
def t1(spark):
    return table1(spark, sf=SF)


@pytest.fixture(scope="module")
def t2(spark):
    return table2(spark, sf=SF)


@pytest.fixture(scope="module")
def t3(spark):
    return table3(spark, sf=SF, with_accuracy=False)


@pytest.fixture(scope="module")
def t4(spark):
    return table4(spark, sf=SF)


def test_table1_covers_all_kgs(t1):
    assert set(t1["kg"]) == set(PAPER_TABLE1)


@pytest.mark.parametrize("name", ["MAG-42M", "YAGO-30M", "DBLP-15M", "YAGO3-10"])
def test_table1_type_counts_match_paper(t1, name):
    row = t1[t1.kg == name].iloc[0]
    assert row["n_type"] == row["paper_n_type"]
    assert row["e_type"] == row["paper_e_type"]


def test_table1_scale_ordering_preserved(t1):
    """Relative KG sizes must follow the paper: MAG > YAGO > DBLP > wikikg2
    in node count."""
    n = t1.set_index("kg")["nodes"]
    assert n["MAG-42M"] > n["YAGO-30M"] > n["DBLP-15M"] > n["ogbl-wikikg2"]


def test_table2_all_nine_tasks(t2):
    assert len(t2) == 9
    assert set(t2["TT"]) == {"NC", "LP"}
    assert list(t2.columns[:6]) == ["TT", "Name", "KG", "Split", "Ratio", "Metric"]


def test_table2_ratios_near_paper(t2):
    for _, row in t2.iterrows():
        got = [float(x) for x in row["Ratio"].split("/")]
        want = [float(x) for x in row["paper_Ratio"].split("/")]
        for g, w in zip(got, want):
            assert g == pytest.approx(w, abs=4.0)


def test_table3_rows_complete(t3):
    assert set(t3["task"]) == set(T3_TASKS)
    assert set(t3["method"]) == {"RW", "BRW", "IBS", "d1h1"}
    assert len(t3) == 16


@pytest.mark.parametrize("method", ["BRW", "IBS", "d1h1"])
def test_table3_task_oriented_methods_have_zero_disconnected(t3, method):
    """The paper's Table III: all three task-oriented extractors eliminate
    target-disconnected vertices; URW does not (on MAG/YAGO)."""
    assert (t3[t3.method == method]["discon_pct"] == 0).all()


def test_table3_urw_leaves_disconnected_mass(t3):
    rw = t3[t3.method == "RW"].set_index("task")
    assert rw.loc["PV/MAG-42M", "discon_pct"] > 20
    assert rw.loc["CG/YAGO-30M", "discon_pct"] > 20


def test_table3_target_ratio_ordering(t3):
    """BRW and d1h1 raise the target-vertex ratio over URW on every task."""
    for task in T3_TASKS:
        sub = t3[t3.task == task].set_index("method")
        assert sub.loc["BRW", "V_T_pct"] > sub.loc["RW", "V_T_pct"]
        assert sub.loc["d1h1", "V_T_pct"] > sub.loc["RW", "V_T_pct"]


def test_table3_types_reduced(t3):
    """|C'| and |R'| shrink vs the full KG for the task-oriented methods."""
    from repro.kg.generator import EXPECTED_TYPE_COUNTS

    for task in T3_TASKS:
        kg_name = task.split("/")[1]
        c_full, r_full = EXPECTED_TYPE_COUNTS[kg_name]
        sub = t3[t3.task == task].set_index("method")
        for m in ("BRW", "IBS", "d1h1"):
            assert sub.loc[m, "C'"] < c_full
            assert sub.loc[m, "R'"] < r_full


def test_table4_covers_six_nc_tasks(t4):
    assert len(t4) == 6


def test_table4_kgp_smaller_model(t4):
    assert (t4["kgp_params"] < t4["fg_params"]).all()


def test_table4_totals_consistent(t4):
    np.testing.assert_allclose(
        t4["fg_total_s"], t4["fg_transform_s"] + t4["fg_train_s"], rtol=1e-6
    )
    np.testing.assert_allclose(
        t4["kgp_total_s"],
        t4["kgp_extract_s"] + t4["kgp_transform_s"] + t4["kgp_train_s"],
        rtol=1e-6,
    )


def test_table4_training_time_reduced(t4):
    """KG' training must be faster than FG for most tasks (the headline
    claim); allow one exception at tiny scale."""
    wins = (t4["kgp_train_s"] < t4["fg_train_s"]).sum()
    assert wins >= len(t4) - 1


def test_to_markdown_renders(t1):
    md = to_markdown(t1)
    assert md.startswith("| kg |")
    assert md.count("\n") == len(t1) + 1

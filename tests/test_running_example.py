"""E0 — the paper's §2.2/§3.2 worked example: Fig. 1 snapshots, IM-1 vs
IM-2 tuple-count costs, and the retraction-driven crossover."""
import pytest

from repro.experiments import running_example as ex


def test_fig1_snapshot_values(spark):
    """§3.2 pins: gross(c1)=280 at t1 and 265 at t2 (280 + (-15))."""
    vals = ex.check_fig1_snapshot(spark)
    assert vals["t1_c1"] == pytest.approx(280.0)
    assert vals["t2_c1"] == pytest.approx(265.0)


def test_im1_im2_agree_on_final_result(spark):
    a = ex.run_im1(spark, 0)["final"].toPandas().set_index("cat")["gross"]
    b = ex.run_im2(spark, 0)["final"].toPandas().set_index("cat")["gross"]
    assert dict(a.sort_index()) == dict(b.sort_index())


def test_im1_wins_without_retraction(spark):
    rows = {r["retractions"]: r for r in ex.run(spark)}
    assert rows[0]["winner"] == "IM-1"


def test_im2_wins_with_enough_retraction(spark):
    rows = {r["retractions"]: r for r in ex.run(spark)}
    assert rows[2]["winner"] == "IM-2"


def test_retraction_raises_im1_cost_monotonically(spark):
    rows = {r["retractions"]: r for r in ex.run(spark)}
    assert rows[0]["IM1_cost"] < rows[1]["IM1_cost"] < rows[2]["IM1_cost"]


def test_im2_cost_insensitive_to_retraction(spark):
    rows = {r["retractions"]: r for r in ex.run(spark)}
    spread = rows[2]["IM2_cost"] - rows[0]["IM2_cost"]
    im1_spread = rows[2]["IM1_cost"] - rows[0]["IM1_cost"]
    assert spread < im1_spread


def test_im1_im2_agree_under_retraction(spark):
    a = ex.run_im1(spark, 2)["final"].toPandas().set_index("cat")["gross"]
    b = ex.run_im2(spark, 2)["final"].toPandas().set_index("cat")["gross"]
    assert dict(a.sort_index()) == pytest.approx(dict(b.sort_index()))

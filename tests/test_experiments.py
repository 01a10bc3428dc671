"""Smoke/shape tests for the table harnesses at tiny scale (the bench
runs execute the same code paths at bench scale)."""
import pytest

from repro.experiments import ablation, datasets, psweep, report, table2, table3


def test_table2_row_fields(spark):
    row = table2.dataset_stats(spark, "it", "tiny")
    assert row["U"] > 0 and row["V"] > 0 and row["E"] > 0
    assert row["theta_max_U"] >= 0 and row["theta_max_V"] >= 0
    assert row["butterflies"] > 0


def test_table2_markdown(spark):
    out = table2.run(spark, "tiny", names=["it", "tr"])
    assert len(out["rows"]) == 2
    assert out["markdown"].startswith("| Dataset |")
    assert "Tr" in out["markdown"]


def test_table3_side(spark):
    col = table3.run_side(
        spark, "it", "u", scale="tiny", n_partitions=4, parb_spark_enabled=False
    )
    assert col["label"] == "ItU"
    assert col["t_parb"] is None  # spark ParB skipped -> "-" cell
    assert col["rho_receipt"] < col["rho_parb"]
    assert col["w_receipt"] < col["w_bup"]  # optimizations beat BUP's Λ here


def test_table3_markdown(spark):
    out = table3.run(
        spark,
        scale="tiny",
        sides=[("it", "v")],
        n_partitions=3,
        parb_spark_enabled=False,
    )
    assert "ItV" in out["markdown"]
    assert "ρ RECEIPT" in out["markdown"]


def test_ablation_side(spark):
    col = ablation.run_side(spark, "it", "u", scale="tiny", n_partitions=4)
    assert col["wnorm_RECEIPT--"] == 1.0
    assert col["wnorm_RECEIPT"] <= col["wnorm_RECEIPT-"] <= 1.0


def test_psweep(spark):
    out = psweep.run(spark, scale="tiny", sides=[("it", "u")], ps=(2, 6))
    assert out["ps"] == [2, 6]
    assert out["columns"][0]["rho_P2"] <= out["columns"][0]["rho_P6"] * 10


def test_report_fmt():
    assert report.fmt(None) == "-"
    assert report.fmt(float("inf")) == "∞"
    assert report.fmt(1234567) == "1,234,567"
    assert report.fmt(1.25) == "1.250"  # sub-10 floats keep 3 dp (norms)
    assert report.fmt(96.37) == "96.4"


def test_report_markdown_table():
    md = report.markdown_table(["a", "b"], [[1, 2.5], ["x", None]])
    lines = md.splitlines()
    assert lines[0] == "| a | b |"
    assert lines[1] == "|---|---|"
    assert "| x | - |" in md


def test_sides_registry():
    assert len(datasets.SIDES) == 12
    assert datasets.SIDES[0] == ("it", "u")


@pytest.mark.parametrize(
    "mod", ["table2_datasets", "table3_comparison", "opt_ablation", "p_sweep"]
)
def test_jobs_importable(mod):
    import importlib.util
    import pathlib

    path = pathlib.Path(__file__).resolve().parents[1] / "jobs" / f"{mod}.py"
    spec = importlib.util.spec_from_file_location(mod, path)
    m = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(m)
    assert callable(m.main)

"""spark-submit entrypoint for T5 — baseline comparison (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table5


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table5(spark, scale)


if __name__ == "__main__":
    run_table("repro-table5_baselines", build, "T5 — baseline comparison")

"""spark-submit entrypoint for T7 — runtime scaling (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table7


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table7(spark, scale)


if __name__ == "__main__":
    run_table("repro-table7_runtime", build, "T7 — runtime scaling")

"""spark-submit entrypoint for T3 — single-space sampler accuracy (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table3


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table3(spark, scale)


if __name__ == "__main__":
    run_table("repro-table3_single", build, "T3 — single-space sampler accuracy")

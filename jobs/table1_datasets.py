"""spark-submit entrypoint for T1 — dataset summary (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table1


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table1(spark, scale)


if __name__ == "__main__":
    run_table("repro-table1_datasets", build, "T1 — dataset summary")

"""spark-submit entrypoint for T4 — (eps,delta) guarantee coverage (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table4


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table4(spark, scale)


if __name__ == "__main__":
    run_table("repro-table4_epsdelta", build, "T4 — (eps,delta) guarantee coverage")

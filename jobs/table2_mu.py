"""spark-submit entrypoint for T2 — mu(r) across families (Theorem 2) (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table2


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table2(spark, scale)


if __name__ == "__main__":
    run_table("repro-table2_mu", build, "T2 — mu(r) across families (Theorem 2)")

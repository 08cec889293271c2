"""spark-submit entrypoint for T6 — joint-space sampler (see DESIGN.md table index)."""
from _common import run_table
from repro.evalharness.tables import table6


def build(spark, scale="bench"):
    """Build the table DataFrame (importable from tests)."""
    return table6(spark, scale)


if __name__ == "__main__":
    run_table("repro-table6_joint", build, "T6 — joint-space sampler")

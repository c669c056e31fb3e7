"""DuckDB SQL for h-support — the oracle side of the comparison.

Generates plain SQL (no recursion, just ``h-1`` chained join CTEs) that
computes the h-support of every canonical edge over a table named
``edges`` with integer columns ``src, dst``. Used with
:func:`repro.oracle.assert_equivalent` to check the Spark pipeline on an
engine with a completely independent join/dedup implementation.
"""


def h_support_sql(h: int) -> str:
    """SQL text computing ``(src, dst, support)`` for every edge.

    Reachability (membership within ``h`` hops), not distance, is what
    h-support needs, so each CTE level is the union of the previous level
    with its one-hop expansion.
    """
    if h < 1:
        raise ValueError(f"h must be >= 1, got {h}")
    ctes = [
        "sym AS ("
        " SELECT src AS a, dst AS b FROM edges WHERE src <> dst"
        " UNION"
        " SELECT dst AS a, src AS b FROM edges WHERE src <> dst)",
        "reach1 AS (SELECT a, b FROM sym)",
    ]
    for d in range(2, h + 1):
        ctes.append(
            f"reach{d} AS ("
            f" SELECT a, b FROM reach{d-1}"
            f" UNION"
            f" SELECT r.a AS a, s.b AS b FROM reach{d-1} r"
            f" JOIN sym s ON r.b = s.a WHERE r.a <> s.b)"
        )
    ctes.append(
        "canon AS (SELECT DISTINCT least(src, dst) AS src,"
        " greatest(src, dst) AS dst FROM edges WHERE src <> dst)"
    )
    ctes.append(
        f"common AS ("
        f" SELECT c.src, c.dst, r1.b AS w FROM canon c"
        f" JOIN reach{h} r1 ON r1.a = c.src"
        f" JOIN reach{h} r2 ON r2.a = c.dst AND r2.b = r1.b"
        f" WHERE r1.b <> c.src AND r1.b <> c.dst)"
    )
    return (
        "WITH "
        + ",\n".join(ctes)
        + "\nSELECT c.src, c.dst, CAST(COUNT(m.w) AS BIGINT) AS support"
        "\nFROM canon c LEFT JOIN common m ON m.src = c.src AND m.dst = c.dst"
        "\nGROUP BY c.src, c.dst"
    )

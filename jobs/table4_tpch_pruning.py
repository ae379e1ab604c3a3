"""Reproduce §8.3: TPC-H pruning ratios under date clustering."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, session, tpch_lake  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table4")
    tables = tpch_lake(spark, args)
    ours = X.table4_tpch(tables)
    print(
        "Table 4 — TPC-H pruning ratios "
        "(clustered on l_shipdate/o_orderdate, §8.3/Fig. 13)"
    )
    print(X.format_table4(ours))
    spark.stop()


if __name__ == "__main__":
    main()

"""Table 15 — query time vs column size.
Usage: python jobs/table15_time_vs_colsize.py [dataset] [equi|semantic]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, Scale
from repro.eval.experiments import table15_time_vs_colsize
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    jts = [sys.argv[2]] if len(sys.argv) > 2 else ["equi", "semantic"]
    ctx = ExperimentContext(get_spark(), ds, Scale("size", 12_000, 2_000, 150))
    for jt in jts:
        write_result(f"table15_{ds}_{jt}", to_markdown(
            table15_time_vs_colsize(ctx, jt), f"Table 15 {jt} ({ds})"))

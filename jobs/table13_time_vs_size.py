"""Table 13 — query time vs repository size.
Usage: python jobs/table13_time_vs_size.py [dataset] [equi|semantic]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table13_time_vs_size
from repro.eval.report import to_markdown

SIZES = {"webtable": (4000, 8000, 12000, 16000, 20000),
         "wikitable": (2000, 4000, 6000, 8000, 10000)}

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    jts = [sys.argv[2]] if len(sys.argv) > 2 else ["equi", "semantic"]
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    for jt in jts:
        write_result(f"table13_{ds}_{jt}", to_markdown(
            table13_time_vs_size(ctx, jt, SIZES[ds]), f"Table 13 {jt} ({ds})"))

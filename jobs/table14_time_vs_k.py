"""Table 14 — query time vs k. Usage: python jobs/table14_time_vs_k.py [dataset] [equi|semantic]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table14_time_vs_k
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    jts = [sys.argv[2]] if len(sys.argv) > 2 else ["equi", "semantic"]
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    for jt in jts:
        write_result(f"table14_{ds}_{jt}", to_markdown(
            table14_time_vs_k(ctx, jt), f"Table 14 {jt} ({ds})"))

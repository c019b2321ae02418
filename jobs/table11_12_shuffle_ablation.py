"""Tables 11/12 — cell-shuffle augmentation ablation.
Usage: python jobs/table11_12_shuffle_ablation.py [dataset] [equi|semantic]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table11_12_shuffle_ablation
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    jts = [sys.argv[2]] if len(sys.argv) > 2 else ["equi", "semantic"]
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    for jt in jts:
        tid = 11 if jt == "equi" else 12
        write_result(f"table{tid:02d}_{ds}", to_markdown(
            table11_12_shuffle_ablation(ctx, jt), f"Table {tid} {jt} ({ds})"))

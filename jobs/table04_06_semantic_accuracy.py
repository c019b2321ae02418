"""Tables 4-6 — semantic-join accuracy at tau in {0.9, 0.8, 0.7}.
Usage: python jobs/table04_06_semantic_accuracy.py [dataset] [tau]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table4_6_semantic_accuracy
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    taus = [float(sys.argv[2])] if len(sys.argv) > 2 else [0.9, 0.8, 0.7]
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    for tau, tid in zip(taus, (4, 5, 6)):
        write_result(f"table{tid:02d}_{ds}", to_markdown(
            table4_6_semantic_accuracy(ctx, tau), f"Table {tid} tau={tau} ({ds})"))

"""spark-submit entrypoint: Tables XIII-XVIII: learned weights.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table13_weights.py`` or
``python jobs/table13_weights.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table13_learned_weights

if __name__ == "__main__":
    main(table13_learned_weights, 'Tables XIII-XVIII: learned weights')

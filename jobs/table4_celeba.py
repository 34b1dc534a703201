"""spark-submit entrypoint: Table IV: accuracy on CelebA (lite).

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table4_celeba.py`` or
``python jobs/table4_celeba.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table4_celeba

if __name__ == "__main__":
    main(table4_celeba, 'Table IV: accuracy on CelebA (lite)')

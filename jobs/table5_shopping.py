"""spark-submit entrypoint: Table V/XXI: accuracy on Shopping (lite).

``--category tshirt`` (default, Tab. V) or ``--category bottoms``
(Tab. XXI — MUST rows reuse the weights learned on tshirt).
Usage: ``spark-submit jobs/table5_shopping.py [--category bottoms]``.
"""
import argparse

from _common import main
from repro.eval.tables import table5_shopping

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--category", default="tshirt", choices=["tshirt", "bottoms"])
    args = ap.parse_args()
    main(
        table5_shopping,
        f"Table V/XXI: accuracy on Shopping ({args.category})",
        category=args.category,
    )

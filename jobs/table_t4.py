"""spark-submit entrypoint regenerating table T4 (best vs worst cases)."""
from common import main

from repro.experiments import t4_cases

if __name__ == "__main__":
    main(t4_cases, "T4 - best vs worst case ranking functions")

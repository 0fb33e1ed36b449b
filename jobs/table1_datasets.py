"""Reproduce Table 1: dataset statistics (scaled synthetic stand-ins)."""
from _common import print_table
from repro.experiments.tables import table1_datasets

if __name__ == "__main__":
    print_table("Table 1: Datasets", table1_datasets())

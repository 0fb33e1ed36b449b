"""Reproduce Table 2: advertiser budgets and CPE values."""
from _common import print_table
from repro.experiments.tables import table2_budgets

if __name__ == "__main__":
    print_table("Table 2: Advertiser budgets and CPE values", table2_budgets())

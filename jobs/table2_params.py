"""Table II — parameter glossary (definitional; mirrors ensemfdet()'s surface)."""
from repro.eval.tables import format_markdown, table2_rows

if __name__ == "__main__":
    print("## Table II — parameters used in experiments")
    print(format_markdown(table2_rows()))

"""Print Table 2 (dataset properties of the synthetic suite)."""
from repro.exp.experiments import table2_experiment

if __name__ == "__main__":
    print(table2_experiment())

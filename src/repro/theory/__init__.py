"""The paper's analytical results as executable checks."""

"""The paper's contribution: DITS index and the OJSP/CJSP search algorithms."""

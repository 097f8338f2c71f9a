"""The paper's primary contribution: theme-community mining over database
networks — MPTD, TCS, TCFA, TCFI, truss decomposition, and the TC-Tree
index (Chu et al., VLDB 2019)."""

"""Database-network substrate: synthetic generators standing in for the
paper's BK/GW/AMINER datasets, the paper's own SYN procedure, BFS sampling,
and network statistics (Table 2)."""

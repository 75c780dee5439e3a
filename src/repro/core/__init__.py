"""The paper's contribution: NRC, plan algebra, unnesting, shredding, skew."""

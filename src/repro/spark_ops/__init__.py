"""The paper's relational-operator formulation at the DataFrame level."""

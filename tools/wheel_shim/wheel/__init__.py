"""Minimal offline stand-in for the ``wheel`` package.

The reproduction container has setuptools but no ``wheel`` and no
network, while ``pip install -e .`` (PEP 660 editable) needs
``wheel.wheelfile.WheelFile`` and the ``bdist_wheel`` command. This
shim implements exactly the surface setuptools' ``editable_wheel``
command uses. Installed into site-packages by ``tools/install_shim.sh``.
"""
__version__ = "0.0.shim"
